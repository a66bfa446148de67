"""End-to-end tests for RSJoin (Algorithm 6) and the SJoin baseline:
exact result recovery, DuckDB ground truth, uniformity, and counters."""
import math
import random

import pytest

from repro.joins import catalog
from repro.joins.query import JoinQuery
from repro.joins.reference import brute_force_join
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin
from tests.util import duck, tiny_graph


def _graph_case(cq, n_edges, seed, n_nodes=None):
    pdf = tiny_graph(n_edges, n_nodes or max(4, int(n_edges**0.5) + 3), seed)
    stream = cq.stream({"G": pdf}, seed=seed)
    truth = duck(cq.sql(), G=pdf)
    return pdf, stream, truth


ENGINES = [
    ("rsjoin", lambda q, k, seed: RSJoin(q, k, seed=seed)),
    ("rsjoin-grouped", lambda q, k, seed: RSJoin(q, k, seed=seed, grouping=True)),
    ("sjoin", lambda q, k, seed: SJoin(q, k, seed=seed)),
]


@pytest.mark.parametrize("ename,make", ENGINES, ids=[e[0] for e in ENGINES])
@pytest.mark.parametrize("qk", [2, 3, 4])
def test_full_recovery_line(qk, ename, make):
    """k ≥ |Q(R)| ⇒ the reservoir is exactly the full result set."""
    cq = catalog.line_k(qk)
    _, stream, truth = _graph_case(cq, 20, seed=qk)
    eng = make(cq.query, max(len(truth), 1) + 10, 0).run(stream)
    assert set(eng.sample) == truth
    assert len(eng.sample) == len(truth)


@pytest.mark.parametrize("ename,make", ENGINES, ids=[e[0] for e in ENGINES])
def test_full_recovery_star(ename, make):
    cq = catalog.star_k(3)
    _, stream, truth = _graph_case(cq, 15, seed=9)
    eng = make(cq.query, len(truth) + 5, 1).run(stream)
    assert set(eng.sample) == truth


@pytest.mark.parametrize("ename,make", ENGINES, ids=[e[0] for e in ENGINES])
def test_full_recovery_qz(ename, make):
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qz()
    tables = tpcds_lite(0.00002, seed=2, hd_rows=6)
    stream = cq.stream(tables, seed=2)
    truth = duck(cq.sql(), **tables)
    eng = make(cq.query, len(truth) + 10, 3).run(stream)
    assert set(eng.sample) == truth


@pytest.mark.parametrize("ename,make", ENGINES, ids=[e[0] for e in ENGINES])
def test_samples_are_valid_results(ename, make):
    """Small k: every sampled tuple is a genuine join result."""
    cq = catalog.line_k(3)
    _, stream, truth = _graph_case(cq, 40, seed=5)
    assert len(truth) > 20
    eng = make(cq.query, 7, 4).run(stream)
    assert len(eng.sample) == 7
    assert set(eng.sample) <= truth
    assert len(set(eng.sample)) == 7  # without replacement


@pytest.mark.parametrize("ename,make", ENGINES, ids=[e[0] for e in ENGINES])
def test_uniformity(ename, make):
    """Inclusion frequency of every join result ≈ Binomial(runs, k/|Q|)."""
    cq = catalog.line_k(3)
    pdf = tiny_graph(12, 5, seed=11)
    truth = sorted(duck(cq.sql(), G=pdf))
    n = len(truth)
    assert 8 <= n <= 400
    k, runs = 5, 1200
    counts = {t: 0 for t in truth}
    for sd in range(runs):
        stream = cq.stream({"G": pdf}, seed=sd)  # fresh arrival order each run
        eng = make(cq.query, k, sd).run(stream)
        for t in eng.sample:
            counts[t] += 1
    p = min(1.0, k / n)
    mean, std = runs * p, math.sqrt(runs * p * (1 - p))
    for t, c in counts.items():
        assert abs(c - mean) <= 6 * std + 1, (t, c, mean, std)


def test_rsjoin_matches_sjoin_exact_counts():
    """SJoin's exact deltas count |Q(R)|; RSJoin's padded deltas bound it."""
    cq = catalog.line_k(3)
    _, stream, truth = _graph_case(cq, 30, seed=6)
    rs = RSJoin(cq.query, 5, seed=0).run(stream)
    sj = SJoin(cq.query, 5, seed=0).run(stream)
    assert sj.total_delta == len(truth)
    assert rs.total_delta >= len(truth)
    n_rel = len(cq.query.relations)
    if truth:
        assert rs.total_delta <= len(truth) / (0.5 ** (2 * n_rel))


def test_duplicates_are_noops():
    cq = catalog.line_k(2)
    pdf = tiny_graph(10, 5, seed=7)
    stream = cq.stream({"G": pdf}, seed=7)
    eng = RSJoin(cq.query, 100, seed=0).run(stream)
    before = (set(eng.sample), eng.n_inserted, eng.total_delta)
    eng.run(stream)  # replay the whole stream
    assert (set(eng.sample), eng.n_inserted, eng.total_delta) == before


def test_sampling_disabled():
    cq = catalog.line_k(3)
    _, stream, _ = _graph_case(cq, 20, seed=8)
    eng = RSJoin(cq.query, 5, sampling=False).run(stream)
    assert eng.sample == [] and eng.total_delta == 0
    sj = SJoin(cq.query, 5, sampling=False).run(stream)
    assert sj.sample == []


def test_single_relation_query():
    q = JoinQuery.of(R=("A", "B"))
    eng = RSJoin(q, 100, seed=0)
    rows = [(i, i * 2) for i in range(20)]
    for r in rows:
        eng.insert("R", r)
    assert sorted(eng.sample) == rows
    small = RSJoin(q, 5, seed=1)
    for r in rows:
        small.insert("R", r)
    assert len(small.sample) == 5 and set(small.sample) <= set(rows)


def test_two_table_join_matches_duckdb():
    cq = catalog.line_k(2)
    pdf, stream, truth = _graph_case(cq, 25, seed=3)
    eng = RSJoin(cq.query, len(truth) + 1, seed=0).run(stream)
    assert set(eng.sample) == truth


def test_prop_count_grouping_reduces_qz():
    """The Fig 9 metric: grouping cuts propagation-loop executions on QZ."""
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qz()
    tables = tpcds_lite(0.0002, seed=5, hd_rows=12)
    stream = cq.stream(tables, seed=5)
    plain = RSJoin(cq.query, 10, seed=0).run(stream)
    grouped = RSJoin(cq.query, 10, seed=0, grouping=True).run(stream)
    assert grouped.prop_count <= plain.prop_count
    truth = duck(cq.sql(), **tables)
    big1 = RSJoin(cq.query, len(truth) + 5, seed=1, grouping=True).run(stream)
    assert set(big1.sample) == truth


def test_rsjoin_draw_full_index():
    cq = catalog.line_k(3)
    _, stream, truth = _graph_case(cq, 20, seed=12)
    eng = RSJoin(cq.query, 5, seed=0, full_index=True).run(stream)
    rng = random.Random(1)
    for _ in range(50):
        s = eng.draw(rng)
        assert s in truth


def test_update_cost_scales_near_linearly():
    """Amortized O(log N): RSJoin's propagation count stays near-linear in N
    while SJoin's grows much faster on a skewed star-3 (hub propagation)."""
    from repro.datasets.graph import power_law_edges

    cq = catalog.star_k(3)
    small = power_law_edges(150, 60, seed=1)
    large = power_law_edges(600, 240, seed=1)
    ratios = {}
    for name, make in [("rs", lambda q: RSJoin(q, 4, sampling=False)),
                       ("sj", lambda q: SJoin(q, 4, sampling=False))]:
        c = []
        for pdf in (small, large):
            stream = cq.stream({"G": pdf}, seed=0)
            eng = make(cq.query).run(stream)
            c.append(max(eng.prop_count, 1))
        ratios[name] = c[1] / c[0]
    # 4x the input: RSJoin propagation grows roughly linearly (≲ ~8x with
    # log factor); SJoin grows super-linearly and strictly faster.
    assert ratios["sj"] > ratios["rs"]
