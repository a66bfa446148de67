"""Fig 7 benchmark: running time vs input size and join size (line-3)."""
import pytest

from repro.experiments import fig7_rows


def test_fig7_input_size(benchmark):
    rows = benchmark.pedantic(
        lambda: fig7_rows(graph_scale=0.25, k=500, budget_s=60.0),
        rounds=1, iterations=1,
    )
    rs = [r for r in rows if r["method"] == "RSJoin"]
    assert [r["pct"] for r in rs] == list(range(10, 101, 10))
    # join size grows super-linearly in the input while RSJoin time does not:
    # time(100%) / time(10%) ≪ joinsize(100%) / joinsize(10%)
    t_ratio = rs[-1]["seconds"] / max(rs[0]["seconds"], 1e-9)
    j_ratio = rs[-1]["join_size"] / max(rs[0]["join_size"], 1)
    benchmark.extra_info["time_ratio_10x_input"] = round(t_ratio, 1)
    benchmark.extra_info["join_size_ratio_10x_input"] = round(j_ratio, 1)
    benchmark.extra_info["final_join_size"] = rs[-1]["join_size"]
    assert j_ratio > t_ratio  # the Fig 7 takeaway
