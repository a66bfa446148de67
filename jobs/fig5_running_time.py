"""Figure 5: total running time over all queries × methods."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig5_rows, format_table


def job(spark, graph_scale=1.0, tpcds_sf=0.002, ldbc_sf=0.002, k_graph=1000,
        k_rel=10000, budget_s=90.0):
    rows = fig5_rows(
        graph_scale=graph_scale, tpcds_sf=tpcds_sf, ldbc_sf=ldbc_sf,
        k_graph=k_graph, k_rel=k_rel, budget_s=budget_s,
    )
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "graph_scale": (float, 1.0, "graph scale (1.0 = 10k edges)"),
        "tpcds_sf": (float, 0.002, "TPC-DS-lite scale factor"),
        "ldbc_sf": (float, 0.002, "LDBC-lite scale factor"),
        "k_graph": (int, 1000, "sample size for graph queries"),
        "k_rel": (int, 10000, "sample size for relational queries"),
        "budget_s": (float, 90.0, "per-run timeout (the paper's 12h)"),
    })
