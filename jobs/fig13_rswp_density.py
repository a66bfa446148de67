"""Figure 13: RSWP vs RS total time across 11 stream densities."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig13_rows, format_table


def job(spark, n=20000, k=200, length=192):
    rows = fig13_rows(n=n, k=k, length=length)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "n": (int, 20000, "stream length"),
        "k": (int, 200, "sample size"),
        "length": (int, 192, "string length (paper: 1024)"),
    })
