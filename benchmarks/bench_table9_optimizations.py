"""Fig 9 (table) benchmark: QZ optimization variants — the propagation-loop
execution counts are the table's first column; run time is the second."""
import pytest

from repro.experiments import table9_rows


def test_table9_optimizations(benchmark):
    rows = benchmark.pedantic(
        lambda: table9_rows(tpcds_sf=0.0005, k=2000, budget_s=60.0),
        rounds=1, iterations=1,
    )
    by = {r["optimizations"]: r for r in rows}
    for label, r in by.items():
        benchmark.extra_info[f"executions[{label}]"] = r["executions"]
        benchmark.extra_info[f"seconds[{label}]"] = round(r["seconds"], 3)
    # The paper's Table 9 ordering: each optimization strictly reduces the
    # number of propagation-loop executions.
    assert by["Foreign-key"]["executions"] <= by["N/A"]["executions"]
    assert (
        by["Foreign-key + Grouping"]["executions"]
        <= by["Foreign-key"]["executions"]
    )
