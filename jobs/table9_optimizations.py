"""Figure 9 (the evaluation table): optimizations on QZ — propagation-loop
executions and run time for N/A vs Foreign-key vs Foreign-key+Grouping."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import format_table, table9_rows


def job(spark, tpcds_sf=0.002, k=10000, budget_s=300.0):
    rows = table9_rows(tpcds_sf=tpcds_sf, k=k, budget_s=budget_s)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "tpcds_sf": (float, 0.002, "TPC-DS-lite scale factor"),
        "k": (int, 10000, "sample size"),
        "budget_s": (float, 300.0, "per-variant budget"),
    })
