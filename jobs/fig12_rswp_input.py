"""Figure 12: RSWP vs RS cumulative time over a 1/10-dense string stream."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig12_rows, format_table


def job(spark, n=20000, density=0.1, k=200, length=192):
    rows = fig12_rows(n=n, density=density, k=k, length=length)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "n": (int, 20000, "stream length"),
        "density": (float, 0.1, "fraction of real items"),
        "k": (int, 200, "sample size"),
        "length": (int, 192, "string length (paper: 1024)"),
    })
