"""Fig 12/13 benchmark: reservoir sampling with predicate (RSWP) vs the
classic RS baseline on edit-distance string streams."""
import pytest

from repro.experiments import fig12_rows, fig13_rows


def test_fig12_input_sweep(benchmark):
    rows = benchmark.pedantic(
        lambda: fig12_rows(n=6000, density=0.1, k=60, length=96),
        rounds=1, iterations=1,
    )
    rswp = {r["pct"]: r["seconds"] for r in rows if r["method"] == "RSWP"}
    rs = {r["pct"]: r["seconds"] for r in rows if r["method"] == "RS"}
    benchmark.extra_info["rswp_100pct_s"] = round(rswp[100], 3)
    benchmark.extra_info["rs_100pct_s"] = round(rs[100], 3)
    # after the fill phase RSWP skips; RS keeps paying the predicate
    assert rswp[100] < rs[100]


def test_fig13_density_sweep(benchmark):
    rows = benchmark.pedantic(
        lambda: fig13_rows(n=6000, k=60, length=96, densities=[0.0, 0.2, 0.6, 1.0]),
        rounds=1, iterations=1,
    )
    rswp = {r["density"]: r["seconds"] for r in rows if r["method"] == "RSWP"}
    rs = {r["density"]: r["seconds"] for r in rows if r["method"] == "RS"}
    for d, s in rswp.items():
        benchmark.extra_info[f"rswp@{d}"] = round(s, 3)
        benchmark.extra_info[f"rs@{d}"] = round(rs[d], 3)
    # Fig 13 shape: at density 1.0 RSWP wins big; at density 0 they converge.
    assert rswp[1.0] < rs[1.0] / 2
    assert rswp[0.0] < rs[0.0] * 3
