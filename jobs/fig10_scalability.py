"""Figure 10: QZ running time vs TPC-DS scale factor (RSJoin, RSJoin_opt)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig10_rows, format_table


def job(spark, k=10000, budget_s=300.0, sf_base=0.0005):
    sfs = [sf_base, sf_base * 3, sf_base * 10, sf_base * 30]  # paper: 1,3,10,30
    rows = fig10_rows(sfs=sfs, k=k, budget_s=budget_s)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "k": (int, 10000, "sample size"),
        "budget_s": (float, 300.0, "per-run budget"),
        "sf_base": (float, 0.0005, "smallest scale factor (×1,3,10,30)"),
    })
