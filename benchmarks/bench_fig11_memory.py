"""Fig 11 benchmark: memory vs input fraction (line-3 and Q10)."""
import pytest

from repro.experiments import fig11_rows


def test_fig11_memory(benchmark):
    rows = benchmark.pedantic(
        lambda: fig11_rows(graph_scale=0.2, ldbc_sf=0.001, k=200),
        rounds=1, iterations=1,
    )
    for workload in ("line-3", "Q10"):
        for method in {r["method"] for r in rows if r["workload"] == workload}:
            series = [r["bytes"] for r in rows
                      if r["workload"] == workload and r["method"] == method]
            assert len(series) == 10
            # memory grows monotonically with the input (linear-space index)
            assert all(b2 >= b1 for b1, b2 in zip(series, series[1:]))
            benchmark.extra_info[f"{workload}/{method}.final_mib"] = round(
                series[-1] / 2**20, 2
            )
