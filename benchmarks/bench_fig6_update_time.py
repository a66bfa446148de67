"""Fig 6 benchmark: per-tuple update time distribution (line-4, sampling off)."""
import pytest

from repro.experiments import fig6_rows


def test_fig6_update_time(benchmark):
    rows = benchmark.pedantic(
        lambda: fig6_rows(graph_scale=0.25, budget_s=30.0), rounds=1, iterations=1
    )
    by = {r["method"]: r for r in rows}
    for m, r in by.items():
        for key in ("mean_us", "p50_us", "p99_us", "max_us"):
            benchmark.extra_info[f"{m}.{key}"] = round(r[key], 2)
    # Shape (paper Fig 6): RSJoin's typical update is microseconds with rare
    # amortized spikes; SJoin's tail/mean is much worse than its median.
    assert by["RSJoin"]["p50_us"] < by["RSJoin"]["max_us"]
    assert by["SJoin"]["mean_us"] > by["RSJoin"]["mean_us"] * 0.1  # both measured
