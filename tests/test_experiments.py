"""Smoke tests for the per-exhibit experiment harnesses (tiny scales) — these
protect the jobs/ and benchmarks/ entrypoints."""
import pytest

from repro import experiments as ex


def test_graph_for_scales():
    pdf = ex.graph_for(0.01)
    assert len(pdf) == 100


def test_run_stream_timed_budget():
    cq = ex._catalog_query("line-3")
    stream = cq.stream({"G": ex.graph_for(0.02)}, seed=0)
    eng = ex._engine_factory(cq, "RSJoin", 10)
    dt, ok = ex.run_stream_timed(eng, stream, budget_s=None)
    assert ok and dt > 0
    eng2 = ex._engine_factory(cq, "RSJoin", 10)
    dt2, ok2 = ex.run_stream_timed(eng2, stream, budget_s=0.0, check_every=1)
    assert not ok2


def test_exact_count_matches_duckdb():
    from tests.util import duck, tiny_graph

    cq = ex._catalog_query("line-3")
    pdf = tiny_graph(15, 5, seed=0)
    rows = list(zip(pdf.src, pdf.dst))
    arrived = {f"G{i}": rows for i in (1, 2, 3)}
    assert ex.exact_count(cq.query, arrived) == len(duck(cq.sql(), G=pdf))
    assert ex.exact_count(cq.query, {"G1": rows}) == 0  # empty copies


def test_fig5_rows_subset():
    rows = ex.fig5_rows(graph_scale=0.02, queries=["line-3"], k_graph=10, budget_s=30)
    methods = {r["method"] for r in rows}
    assert methods == {"RSJoin", "SJoin"}
    assert all(r["finished"] for r in rows)


def test_fig5_rows_dumbbell_marks_sjoin_unsupported():
    rows = ex.fig5_rows(graph_scale=0.02, queries=["dumbbell"], k_graph=10, budget_s=30)
    by = {r["method"]: r for r in rows}
    assert by["RSJoin"]["finished"]
    assert by["SJoin"]["seconds"] is None and not by["SJoin"]["finished"]


def test_fig5_rows_relational_with_opt():
    rows = ex.fig5_rows(queries=["QY"], tpcds_sf=0.00005, k_rel=20, budget_s=30)
    assert {r["method"] for r in rows} == {"RSJoin", "SJoin", "RSJoin_opt", "SJoin_opt"}


def test_fig6_rows_shape():
    rows = ex.fig6_rows(graph_scale=0.02, budget_s=30)
    assert {r["method"] for r in rows} == {"RSJoin", "SJoin"}
    for r in rows:
        assert r["p50_us"] <= r["p99_us"] <= r["max_us"]
        assert r["finished"]


def test_fig7_rows_shape():
    rows = ex.fig7_rows(graph_scale=0.02, k=10, budget_s=60)
    rs = [r for r in rows if r["method"] == "RSJoin"]
    assert [r["pct"] for r in rs] == list(range(10, 101, 10))
    assert all(a["join_size"] <= b["join_size"] for a, b in zip(rs, rs[1:]))
    assert all(a["seconds"] <= b["seconds"] for a, b in zip(rs, rs[1:]))


def test_fig8_rows_shape():
    rows = ex.fig8_rows(graph_scale=0.02, ks=[5, 50], budget_s=60)
    assert len(rows) == 4
    assert {r["k"] for r in rows} == {5, 50}


def test_table9_rows_orders_executions():
    rows = ex.table9_rows(tpcds_sf=0.0002, k=50, budget_s=60)
    assert [r["optimizations"] for r in rows] == [
        "N/A", "Foreign-key", "Foreign-key + Grouping"
    ]
    ex_counts = [r["executions"] for r in rows]
    assert ex_counts[2] <= ex_counts[1] <= ex_counts[0]


def test_fig10_rows_shape():
    rows = ex.fig10_rows(sfs=(0.0001, 0.0002), k=20, budget_s=60)
    assert len(rows) == 4
    assert all(r["finished"] for r in rows)
    assert rows[2]["input_rows"] > rows[0]["input_rows"]


def test_fig11_rows_monotone_memory():
    rows = ex.fig11_rows(graph_scale=0.02, ldbc_sf=0.0005, k=20)
    for wl in ("line-3", "Q10"):
        for m in {r["method"] for r in rows if r["workload"] == wl}:
            series = [r["bytes"] for r in rows if r["workload"] == wl and r["method"] == m]
            assert len(series) == 10
            assert all(b >= a for a, b in zip(series, series[1:]))


def test_fig12_rows_cumulative():
    rows = ex.fig12_rows(n=800, density=0.2, k=20, length=32)
    for m in ("RSWP", "RS"):
        series = [r["seconds"] for r in rows if r["method"] == m]
        assert len(series) == 10
        assert all(b >= a for a, b in zip(series, series[1:]))


def test_fig13_rows_densities():
    rows = ex.fig13_rows(n=600, k=20, length=32, densities=[0.0, 1.0])
    assert {r["density"] for r in rows} == {0.0, 1.0}
    rswp = {r["density"]: r["seconds"] for r in rows if r["method"] == "RSWP"}
    rs = {r["density"]: r["seconds"] for r in rows if r["method"] == "RS"}
    assert rswp[1.0] < rs[1.0]  # dense stream: skipping wins


def test_format_table():
    out = ex.format_table([dict(a=1, b=2.5), dict(a=3, b=None)])
    assert "| a | b |" in out and "| 1 | 2.500 |" in out
    assert ex.format_table([]) == "(no rows)"
