"""Fig 10 benchmark: QZ running time vs scale factor (RSJoin, RSJoin_opt)."""
import pytest

from repro.experiments import fig10_rows


def test_fig10_scalability(benchmark):
    sfs = (0.0002, 0.0006, 0.002)  # 1x, 3x, 10x
    rows = benchmark.pedantic(
        lambda: fig10_rows(sfs=sfs, k=2000, budget_s=60.0), rounds=1, iterations=1
    )
    for r in rows:
        benchmark.extra_info[f"{r['method']}@sf={r['sf']}"] = round(r["seconds"], 3)
        assert r["finished"]
    rs = [r for r in rows if r["method"] == "RSJoin"]
    # near-linear growth: 10x the input costs well under 10x^2 the time
    ratio = rs[-1]["seconds"] / max(rs[0]["seconds"], 1e-9)
    benchmark.extra_info["rsjoin_time_ratio_10x"] = round(ratio, 1)
    assert ratio < 40
