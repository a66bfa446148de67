"""Figure 7: cumulative running time + join size per 10% of the line-3
stream. Join sizes additionally cross-checked with a Spark SQL count over
the full input (Catalyst shuffle join)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig7_rows, format_table, graph_for
from repro.joins import catalog
from repro.spark.runner import exact_join_count


def job(spark, graph_scale=1.0, k=10000, budget_s=120.0):
    rows = fig7_rows(graph_scale=graph_scale, k=k, budget_s=budget_s)
    print(format_table(rows))
    full = exact_join_count(spark, catalog.line_k(3), {"G": graph_for(graph_scale)})
    final = [r for r in rows if r["pct"] == 100 and r["join_size"] is not None]
    for r in final:
        assert r["join_size"] == full, (r["join_size"], full)
    print(f"[spark] final join size cross-check OK: {full}")
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "graph_scale": (float, 1.0, "graph scale"),
        "k": (int, 10000, "sample size"),
        "budget_s": (float, 120.0, "per-method budget"),
    })
