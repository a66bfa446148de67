"""Shared plumbing for spark-submit job entrypoints: each job module exposes
``job(spark, **params) -> DataFrame`` and this runner wraps argparse +
SparkSession creation + printing."""
from __future__ import annotations

import argparse
import sys
from typing import Callable

import pandas as pd


def rows_to_df(spark, rows: list[dict]):
    """Row dicts → Spark DataFrame (via pandas, preserving column order)."""
    return spark.createDataFrame(pd.DataFrame(rows))


def main(job: Callable, params: dict[str, tuple[type, object, str]]) -> None:
    """params: name -> (type, default, help)."""
    ap = argparse.ArgumentParser()
    for name, (typ, default, help_) in params.items():
        ap.add_argument(f"--{name}", type=typ, default=default, help=help_)
    args = ap.parse_args()
    from pyspark.sql import SparkSession

    spark = (
        SparkSession.builder.appName(job.__module__)
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    df = job(spark, **vars(args))
    df.show(500, truncate=False)
    spark.stop()
