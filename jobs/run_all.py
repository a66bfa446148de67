"""Run every evaluation harness at job scale and dump the number tables
(used to fill EXPERIMENTS.md; individual jobs/fig*.py are the spark-submit
entrypoints for single exhibits)."""
import json
import sys
import time
from pathlib import Path

from repro import experiments as ex

OUT = Path(__file__).resolve().parent.parent / "results"


def main():
    OUT.mkdir(exist_ok=True)
    runs = [
        ("fig5", lambda: ex.fig5_rows(budget_s=60.0)),
        ("fig6", lambda: ex.fig6_rows(budget_s=90.0)),
        ("fig7", lambda: ex.fig7_rows(budget_s=90.0)),
        ("fig8", lambda: ex.fig8_rows(budget_s=120.0)),
        ("table9", lambda: ex.table9_rows(budget_s=240.0)),
        ("fig10", lambda: ex.fig10_rows(budget_s=240.0)),
        ("fig11", lambda: ex.fig11_rows()),
        ("fig12", lambda: ex.fig12_rows()),
        ("fig13", lambda: ex.fig13_rows()),
    ]
    only = set(sys.argv[1:])
    md = []
    for name, fn in runs:
        if only and name not in only:
            continue
        t0 = time.perf_counter()
        rows = fn()
        dt = time.perf_counter() - t0
        (OUT / f"{name}.json").write_text(json.dumps(rows, indent=1, default=str))
        block = f"## {name} (harness wall time {dt:.0f}s)\n\n{ex.format_table(rows)}\n"
        print(block, flush=True)
        md.append(block)
    (OUT / "experiments_raw.md").write_text("\n".join(md))


if __name__ == "__main__":
    main()
