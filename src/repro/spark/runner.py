"""Batch-mode Spark integration.

- Ground truth: every catalog query renders to SQL (`CatalogQuery.sql`) that
  runs identically on Spark SQL (Catalyst, shuffle joins — broadcast is
  disabled in conftest) and DuckDB (via `repro.oracle.assert_equivalent`).
- Engine driver: the RSJoin/SJoin engines are sequential streaming data
  structures (DESIGN.md "Layering"); `run_engine` feeds them the tuple
  stream on the driver and returns the reservoir as a Spark DataFrame for
  downstream DataFrame-API consumption.
"""
from __future__ import annotations

from typing import Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.joins.catalog import CatalogQuery
from repro.joins.cyclic import DumbbellRSJoin, dumbbell_stream
from repro.joins.query import JoinQuery
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin


def register_tables(spark: SparkSession, tables: Mapping[str, pd.DataFrame]) -> None:
    """Create/replace one temp view per base table."""
    for name, pdf in tables.items():
        spark.createDataFrame(pdf).createOrReplaceTempView(name)


def spark_join_results(
    spark: SparkSession, cq: CatalogQuery, tables: Mapping[str, pd.DataFrame]
) -> DataFrame:
    """The full join result via Spark SQL (Catalyst; shuffle joins)."""
    register_tables(spark, tables)
    return spark.sql(cq.sql())


def exact_join_count(
    spark: SparkSession, cq: CatalogQuery, tables: Mapping[str, pd.DataFrame]
) -> int:
    """|Q(R)| via Spark (used for Fig 7's join-size axis)."""
    return spark_join_results(spark, cq, tables).count()


def reservoir_to_df(
    spark: SparkSession, samples: Sequence[tuple], attrs: Sequence[str]
) -> DataFrame:
    """The reservoir as a Spark DataFrame with the query's attribute schema."""
    if not samples:
        from pyspark.sql.types import LongType, StructField, StructType

        schema = StructType([StructField(a, LongType()) for a in attrs])
        return spark.createDataFrame([], schema)
    pdf = pd.DataFrame(list(samples), columns=list(attrs))
    return spark.createDataFrame(pdf)


def make_engine(
    cq: CatalogQuery,
    k: int,
    *,
    engine: str = "rsjoin",
    opt: bool = False,
    seed: int = 0,
    grouping: bool = False,
    sampling: bool = True,
):
    """Instantiate the paper's engines by name: rsjoin | sjoin (optionally
    over the FK-combined query with ``opt=True``)."""
    q = cq.opt_query() if opt else cq.query
    if engine == "rsjoin":
        return RSJoin(q, k, seed=seed, grouping=grouping, sampling=sampling)
    if engine == "sjoin":
        return SJoin(q, k, seed=seed, sampling=sampling)
    raise ValueError(f"unknown engine {engine!r}")


def run_engine(
    spark: SparkSession,
    cq: CatalogQuery,
    tables: Mapping[str, pd.DataFrame],
    k: int,
    *,
    engine: str = "rsjoin",
    opt: bool = False,
    seed: int = 0,
    grouping: bool = False,
):
    """Stream the catalog query's tuples through an engine; returns
    ``(engine, reservoir DataFrame)``."""
    eng = make_engine(cq, k, engine=engine, opt=opt, seed=seed, grouping=grouping)
    eng.run(cq.stream(tables, seed=seed, opt=opt))
    attrs = (cq.opt_query() if opt else cq.query).attrs
    return eng, reservoir_to_df(spark, eng.sample, attrs)


def run_dumbbell(
    spark: SparkSession,
    edges_pdf: pd.DataFrame,
    k: int,
    *,
    seed: int = 0,
    grouping: bool = False,
):
    """The cyclic dumbbell query end-to-end (RSJoin only — SJoin does not
    support cyclic queries, as in the paper)."""
    stream = dumbbell_stream(list(zip(edges_pdf.src, edges_pdf.dst)), seed=seed)
    eng = DumbbellRSJoin(k, seed=seed, grouping=grouping).run(stream)
    attrs = ("X1", "X2", "X3", "X4", "X5", "X6")
    return eng, reservoir_to_df(spark, eng.sample, attrs)
