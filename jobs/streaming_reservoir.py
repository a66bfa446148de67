"""Structured Streaming demo: maintain the line-3 reservoir through the
applyInPandasWithState stateful operator (the distributed-dataflow embedding
of Algorithm 6 — see DESIGN.md "Layering"). Not a paper exhibit; this is the
harness deliverable showing the engine living in the Spark state store."""
import sys
import tempfile
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import main, rows_to_df

from repro.experiments import graph_for
from repro.joins import catalog
from repro.joins.rsjoin import RSJoin
from repro.spark.streaming import run_rsjoin_streaming


def job(spark, graph_scale=0.02, k=100, n_files=8):
    cq = catalog.line_k(3)
    stream = cq.stream({"G": graph_for(graph_scale)}, seed=0)
    q = cq.query
    with tempfile.TemporaryDirectory() as wd:
        eng, sample, n_emissions = run_rsjoin_streaming(
            spark, stream, lambda: RSJoin(q, k, seed=0), workdir=wd,
            n_files=n_files, query_name="job_streaming",
        )
    rows = [dict(
        n_stream=len(stream), micro_batches=n_emissions,
        reservoir_size=len(sample), total_delta=eng.total_delta,
    )]
    print(rows[0])
    return rows_to_df(spark, rows)


if __name__ == "__main__":
    main(job, {
        "graph_scale": (float, 0.02, "graph scale"),
        "k": (int, 100, "sample size"),
        "n_files": (int, 8, "stream chunks (micro-batches)"),
    })
