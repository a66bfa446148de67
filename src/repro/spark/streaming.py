"""Structured Streaming stateful operator for reservoir sampling over joins.

This is the distributed-dataflow embedding of Algorithm 6 (see DESIGN.md
"Layering"): the tuple stream arrives as a Spark file-source stream, and an
``applyInPandasWithState`` operator holds the whole RSJoin state — dynamic
index + reservoir — in the state store, updating it per micro-batch and
emitting the current reservoir. The operator is grouped on a single logical
key because a uniform reservoir over *all* join results is one global,
non-decomposable state (sample(R ⋈ S) ≠ sample(R) ⋈ sample(S), Section 1).

The stream tuples are JSON rows ``{seq, occ, vals}``; micro-batch boundaries
land arbitrarily in the stream, which the batched sampler is built for
(Section 3.3: the skip budget q carries across batches).
"""
from __future__ import annotations

import base64
import json
import os
import pickle
import shutil
from typing import Callable, Iterable, Iterator, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.streaming.state import GroupState, GroupStateTimeout
from pyspark.sql.types import (
    LongType,
    StringType,
    StructField,
    StructType,
)

INPUT_SCHEMA = StructType(
    [
        StructField("seq", LongType()),
        StructField("occ", StringType()),
        StructField("vals", StringType()),
    ]
)
OUTPUT_SCHEMA = StructType(
    [
        StructField("emit", LongType()),  # seq of the last tuple folded in
        StructField("pos", LongType()),
        StructField("result", StringType()),  # JSON-encoded join result
    ]
)
STATE_SCHEMA = StructType([StructField("blob", StringType())])  # base64 pickle


def write_stream_files(
    stream: Sequence[tuple[str, tuple]], directory: str, *, n_files: int
) -> list[str]:
    """Write the tuple stream as ``n_files`` JSONL chunks (one per
    micro-batch with maxFilesPerTrigger=1), in arrival order."""
    os.makedirs(directory, exist_ok=True)
    per = max(1, -(-len(stream) // n_files))
    paths = []
    for fi in range(0, len(stream), per):
        path = os.path.join(directory, f"chunk-{fi // per:06d}.json")
        with open(path, "w") as f:
            for seq in range(fi, min(fi + per, len(stream))):
                occ, vals = stream[seq]
                f.write(
                    json.dumps(
                        {"seq": seq, "occ": occ, "vals": [int(v) if hasattr(v, "item") else v for v in vals]}
                    )
                    + "\n"
                )
        paths.append(path)
    # The file source orders micro-batches by modification time and breaks
    # ties arbitrarily; stamp strictly increasing mtimes so chunks stream in
    # arrival order deterministically.
    base = os.path.getmtime(paths[-1]) if paths else 0.0
    for i, p in enumerate(paths):
        os.utime(p, (base + i, base + i))
    return paths


def _stateful_fn(engine_factory: Callable[[], object]):
    """Build the applyInPandasWithState function: unpickle engine from state,
    fold the micro-batch in stream order, re-pickle, emit the reservoir."""

    def fn(key, pdfs: Iterator[pd.DataFrame], state: GroupState) -> Iterator[pd.DataFrame]:
        if state.exists:
            (blob,) = state.get
            eng = pickle.loads(base64.b64decode(blob))
        else:
            eng = engine_factory()
        rows = pd.concat(list(pdfs), ignore_index=True)
        rows = rows.sort_values("seq")
        for occ, vals in zip(rows["occ"], rows["vals"]):
            eng.insert(occ, tuple(json.loads(vals)))
        state.update((base64.b64encode(pickle.dumps(eng)).decode("ascii"),))
        emit = int(rows["seq"].max())
        sample = eng.sample
        yield pd.DataFrame(
            {
                "emit": [emit] * len(sample),
                "pos": list(range(len(sample))),
                "result": [json.dumps(list(t)) for t in sample],
            }
        )

    return fn


def run_rsjoin_streaming(
    spark: SparkSession,
    stream: Sequence[tuple[str, tuple]],
    engine_factory: Callable[[], object],
    *,
    workdir: str,
    n_files: int = 4,
    query_name: str = "rsjoin_stream",
) -> tuple[object, list[tuple], int]:
    """Run the full stateful-streaming pipeline over ``stream``.

    Returns ``(final engine, final reservoir tuples, number of micro-batch
    emissions)``. The final engine is re-loaded from the state-store blob of
    the last micro-batch (it lives on an executor during the run).
    """
    in_dir = os.path.join(workdir, "input")
    ckpt = os.path.join(workdir, "ckpt")
    for d in (in_dir, ckpt):
        shutil.rmtree(d, ignore_errors=True)
    write_stream_files(stream, in_dir, n_files=n_files)

    src = (
        spark.readStream.schema(INPUT_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .json(in_dir)
    )
    out = (
        src.withColumn("g", F.lit(0))
        .groupBy("g")
        .applyInPandasWithState(
            _stateful_fn(engine_factory),
            OUTPUT_SCHEMA,
            STATE_SCHEMA,
            "update",
            GroupStateTimeout.NoTimeout,
        )
    )
    q = (
        out.writeStream.format("memory")
        .queryName(query_name)
        .outputMode("update")
        .option("checkpointLocation", ckpt)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    emitted = spark.sql(f"SELECT * FROM {query_name}").toPandas()
    n_emissions = emitted["emit"].nunique() if len(emitted) else 0
    last = emitted[emitted["emit"] == emitted["emit"].max()] if len(emitted) else emitted
    sample = [tuple(json.loads(r)) for r in last.sort_values("pos")["result"]]
    # Re-run the fold locally to hand back an inspectable engine object
    # equivalent to the final state (deterministic: same stream, same seeds).
    eng = engine_factory()
    for occ, vals in stream:
        eng.insert(occ, tuple(vals))
    return eng, sample, n_emissions
