"""Figure 11: memory usage vs input fraction — line-3 and Q10."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import fig11_rows, format_table


def job(spark, graph_scale=0.5, ldbc_sf=0.002, k=1000):
    rows = fig11_rows(graph_scale=graph_scale, ldbc_sf=ldbc_sf, k=k)
    print(format_table(rows))
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "graph_scale": (float, 0.5, "graph scale"),
        "ldbc_sf": (float, 0.002, "LDBC-lite scale factor"),
        "k": (int, 1000, "sample size"),
    })
