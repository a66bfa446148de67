"""Fig 8 benchmark: running time vs sample size k (line-3)."""
import pytest

from repro.experiments import _catalog_query, graph_for, run_stream_timed
from repro.joins.rsjoin import RSJoin

KS = [50, 500, 5_000, 50_000]  # spans k ≪ N to k > N at this scale


@pytest.fixture(scope="module")
def stream():
    cq = _catalog_query("line-3")
    return cq, cq.stream({"G": graph_for(0.25)}, seed=0)


@pytest.mark.parametrize("k", KS)
def test_fig8_k(benchmark, stream, k):
    cq, s = stream

    def run():
        eng = RSJoin(cq.query, k, seed=0)
        run_stream_timed(eng, s)
        return eng

    eng = benchmark.pedantic(run, rounds=1, iterations=1)
    benchmark.extra_info["n_stream"] = len(s)
    assert len(eng.sample) <= k
