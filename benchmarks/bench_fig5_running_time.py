"""Fig 5 benchmark: total running time per query × method (reduced scale).

The full sweep (paper scale ratios, with DNF budgets) is `jobs/fig5_running_time.py`;
here each (query, method) cell is one pytest-benchmark case.
"""
import pytest

from repro.experiments import (
    _catalog_query,
    _engine_factory,
    _tables_for,
    run_stream_timed,
)
from repro.joins.cyclic import DumbbellRSJoin, dumbbell_stream

SCALE = dict(graph_scale=0.3, tpcds_sf=0.0005, ldbc_sf=0.001)
BUDGET = 30.0

CASES = [
    ("line-3", "RSJoin"), ("line-3", "SJoin"),
    ("line-4", "RSJoin"), ("line-4", "SJoin"),
    ("line-5", "RSJoin"),
    ("star-4", "RSJoin"), ("star-5", "RSJoin"), ("star-6", "RSJoin"),
    ("QX", "RSJoin"), ("QX", "RSJoin_opt"),
    ("QY", "RSJoin"), ("QY", "RSJoin_opt"), ("QY", "SJoin_opt"),
    ("QZ", "RSJoin"), ("QZ", "RSJoin_opt"),
    ("Q10", "RSJoin"), ("Q10", "RSJoin_opt"),
]


@pytest.mark.parametrize("query,method", CASES, ids=[f"{q}-{m}" for q, m in CASES])
def test_fig5_cell(benchmark, query, method):
    cq = _catalog_query(query)
    tables = _tables_for(query, seed=0, **SCALE)
    k = 500 if query.startswith(("line", "star")) else 2000
    stream = cq.stream(tables, seed=0, opt=method.endswith("_opt"))

    def run():
        eng = _engine_factory(cq, method, k, seed=0)
        dt, ok = run_stream_timed(eng, stream, budget_s=BUDGET)
        return eng, ok

    eng, ok = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["finished"] = ok
    benchmark.extra_info["n_stream"] = len(stream)
    benchmark.extra_info["total_delta"] = eng.total_delta
    assert len(eng.sample) <= k


def test_fig5_dumbbell(benchmark):
    tables = _tables_for("line-3", seed=0, **SCALE)
    stream = dumbbell_stream(list(zip(tables["G"].src, tables["G"].dst)), seed=0)

    def run():
        eng = DumbbellRSJoin(500, seed=0)
        dt, ok = run_stream_timed(eng, stream, budget_s=BUDGET)
        return eng, ok

    eng, ok = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["finished"] = ok
    assert ok
