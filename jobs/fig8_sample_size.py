"""Figure 8: total running time vs sample size k on line-3."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig8_rows, format_table


def job(spark, graph_scale=1.0, budget_s=120.0):
    rows = fig8_rows(graph_scale=graph_scale, budget_s=budget_s)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "graph_scale": (float, 1.0, "graph scale"),
        "budget_s": (float, 120.0, "per-run budget"),
    })
