"""Spark-layer tests: Catalyst ground truth vs DuckDB (oracle), reservoir
DataFrames, and the Structured Streaming stateful operator."""
import pytest

from repro.datasets.ldbc import ldbc_lite
from repro.datasets.tpcds import tpcds_lite
from repro.joins import catalog
from repro.joins.cyclic import DUMBBELL_SQL
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin
from repro.oracle import assert_equivalent
from repro.spark.runner import (
    exact_join_count,
    make_engine,
    reservoir_to_df,
    run_dumbbell,
    run_engine,
    spark_join_results,
)
from repro.spark.streaming import run_rsjoin_streaming, write_stream_files
from tests.util import duck, tiny_graph


# ------------------------------------------------ Spark SQL vs DuckDB oracle


@pytest.mark.parametrize("make", [lambda: catalog.line_k(3), lambda: catalog.star_k(3)])
def test_spark_graph_join_matches_duckdb(spark, make):
    cq = make()
    pdf = tiny_graph(25, 7, seed=0)
    df = spark_join_results(spark, cq, {"G": pdf})
    assert_equivalent(df, cq.sql(), G=pdf)


def test_spark_qy_join_matches_duckdb(spark):
    cq = catalog.qy()
    tables = tpcds_lite(0.0001, seed=1, hd_rows=8)
    df = spark_join_results(spark, cq, tables)
    assert_equivalent(df, cq.sql(), **tables)


def test_spark_q10_join_matches_duckdb(spark):
    cq = catalog.q10()
    tables = ldbc_lite(0.0005, seed=1)
    df = spark_join_results(spark, cq, tables)
    assert_equivalent(df, cq.sql(), **tables)


def test_exact_join_count(spark):
    cq = catalog.line_k(3)
    pdf = tiny_graph(20, 6, seed=2)
    assert exact_join_count(spark, cq, {"G": pdf}) == len(duck(cq.sql(), G=pdf))


# ----------------------------------------------------- engine ↔ Spark round


def test_run_engine_full_recovery_oracle(spark):
    """k ≥ |Q| ⇒ the reservoir DataFrame *is* the join — checked by the
    DuckDB oracle end to end."""
    cq = catalog.line_k(3)
    pdf = tiny_graph(20, 6, seed=3)
    n = len(duck(cq.sql(), G=pdf))
    _, df = run_engine(spark, cq, {"G": pdf}, n + 10, engine="rsjoin", seed=0)
    assert_equivalent(df, cq.sql(), G=pdf)


def test_run_engine_sjoin_full_recovery_oracle(spark):
    cq = catalog.line_k(3)
    pdf = tiny_graph(20, 6, seed=4)
    n = len(duck(cq.sql(), G=pdf))
    _, df = run_engine(spark, cq, {"G": pdf}, n + 10, engine="sjoin", seed=0)
    assert_equivalent(df, cq.sql(), G=pdf)


def test_run_engine_sample_subset_of_spark_join(spark):
    """Partial k: anti-join of the reservoir against the Spark-computed join
    must be empty (every sample is a real result) — all in DataFrame API."""
    cq = catalog.line_k(3)
    pdf = tiny_graph(35, 8, seed=5)
    eng, sample_df = run_engine(spark, cq, {"G": pdf}, 9, engine="rsjoin", seed=1)
    assert sample_df.count() == 9
    full = spark_join_results(spark, cq, {"G": pdf})
    missing = sample_df.join(full, on=list(cq.query.attrs), how="left_anti")
    assert missing.count() == 0


def test_run_engine_opt_variant(spark):
    cq = catalog.qy()
    tables = tpcds_lite(0.00005, seed=2, hd_rows=8)
    truth = duck(cq.sql(), **tables)
    eng, df = run_engine(spark, cq, tables, len(truth) + 5, engine="rsjoin", opt=True, seed=0)
    # compare as sets over the combined query's attribute order
    oq = cq.opt_query()
    got = {tuple(r) for r in df.select(*oq.attrs).collect()}
    want = {tuple(t[cq.query.attrs.index(a)] for a in oq.attrs) for t in truth}
    assert got == want


def test_run_dumbbell_oracle(spark):
    pdf = tiny_graph(26, 6, seed=0)
    truth = duck(DUMBBELL_SQL, G=pdf)
    assert truth
    _, df = run_dumbbell(spark, pdf, len(truth) + 10, seed=0)
    assert_equivalent(df, DUMBBELL_SQL, G=pdf)


def test_make_engine_dispatch():
    cq = catalog.line_k(3)
    assert isinstance(make_engine(cq, 5), RSJoin)
    assert isinstance(make_engine(cq, 5, engine="sjoin"), SJoin)
    with pytest.raises(ValueError):
        make_engine(cq, 5, engine="nope")


def test_reservoir_to_df_empty(spark):
    df = reservoir_to_df(spark, [], ("A", "B"))
    assert df.columns == ["A", "B"] and df.count() == 0


# -------------------------------------------- Structured Streaming operator


def test_write_stream_files(tmp_path):
    stream = [("G1", (1, 2)), ("G2", (3, 4)), ("G3", (5, 6))]
    paths = write_stream_files(stream, str(tmp_path / "in"), n_files=2)
    assert len(paths) == 2
    import json

    rows = []
    for p in paths:
        rows += [json.loads(l) for l in open(p)]
    assert [r["seq"] for r in rows] == [0, 1, 2]
    assert rows[1] == {"seq": 1, "occ": "G2", "vals": [3, 4]}


def test_streaming_stateful_operator_full_recovery(spark, tmp_path):
    """The applyInPandasWithState operator over multiple micro-batches ends
    with exactly the full join in its reservoir (k ≥ |Q|), proving the
    engine state survives the state store across batches."""
    cq = catalog.line_k(3)
    pdf = tiny_graph(15, 5, seed=6)
    truth = duck(cq.sql(), G=pdf)
    stream = cq.stream({"G": pdf}, seed=0)
    q = cq.query
    k = len(truth) + 5
    factory = lambda: RSJoin(q, k, seed=0)
    _, sample, n_emissions = run_rsjoin_streaming(
        spark, stream, factory, workdir=str(tmp_path), n_files=5,
        query_name="t_full_recovery",
    )
    assert n_emissions >= 3  # state persisted across several micro-batches
    assert {tuple(t) for t in sample} == truth


def test_streaming_partial_k_valid_samples(spark, tmp_path):
    cq = catalog.line_k(3)
    pdf = tiny_graph(25, 7, seed=7)
    truth = duck(cq.sql(), G=pdf)
    stream = cq.stream({"G": pdf}, seed=1)
    q = cq.query
    factory = lambda: RSJoin(q, 6, seed=3)
    _, sample, _ = run_rsjoin_streaming(
        spark, stream, factory, workdir=str(tmp_path), n_files=4,
        query_name="t_partial",
    )
    assert len(sample) == 6
    assert {tuple(t) for t in sample} <= truth


def test_streaming_matches_batch_run(spark, tmp_path):
    """Micro-batch boundaries must not change behaviour: same seed ⇒ the
    streamed reservoir equals the single-process run (Section 3.3)."""
    cq = catalog.star_k(3)
    pdf = tiny_graph(20, 6, seed=8)
    stream = cq.stream({"G": pdf}, seed=2)
    q = cq.query
    factory = lambda: RSJoin(q, 7, seed=5)
    _, sample, _ = run_rsjoin_streaming(
        spark, stream, factory, workdir=str(tmp_path), n_files=6,
        query_name="t_match_batch",
    )
    ref = RSJoin(q, 7, seed=5).run(stream)
    assert [tuple(t) for t in sample] == [tuple(map(int, t)) for t in ref.sample]


def test_streaming_sjoin_engine(spark, tmp_path):
    cq = catalog.line_k(2)
    pdf = tiny_graph(12, 5, seed=9)
    truth = duck(cq.sql(), G=pdf)
    stream = cq.stream({"G": pdf}, seed=0)
    q = cq.query
    factory = lambda: SJoin(q, len(truth) + 3, seed=0)
    _, sample, _ = run_rsjoin_streaming(
        spark, stream, factory, workdir=str(tmp_path), n_files=3,
        query_name="t_sjoin",
    )
    assert {tuple(t) for t in sample} == truth
