"""Hypothesis property tests: randomized streams/queries against brute force."""
import random

from hypothesis import given, settings, strategies as st

from repro.core.reservoir import BatchReservoir, ListBatch, reservoir_with_predicate
from repro.core.streams import edit_distance
from repro.joins import catalog
from repro.joins.reference import brute_force_join
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin

edges = st.lists(
    st.tuples(st.integers(0, 6), st.integers(0, 6)).filter(lambda e: e[0] != e[1]),
    min_size=1,
    max_size=25,
    unique=True,
)


@settings(max_examples=25, deadline=None)
@given(edges=edges, qk=st.integers(2, 4), seed=st.integers(0, 10**6))
def test_rsjoin_recovers_join_on_random_graphs(edges, qk, seed):
    cq = catalog.line_k(qk)
    stream = [(f"G{i}", e) for i in range(1, qk + 1) for e in edges]
    random.Random(seed).shuffle(stream)
    truth = brute_force_join(cq.query, {f"G{i}": edges for i in range(1, qk + 1)})
    eng = RSJoin(cq.query, len(truth) + 5, seed=seed).run(stream)
    assert set(eng.sample) == truth


@settings(max_examples=15, deadline=None)
@given(edges=edges, seed=st.integers(0, 10**6))
def test_sjoin_counts_exactly_on_random_graphs(edges, seed):
    cq = catalog.star_k(3)
    stream = [(f"G{i}", e) for i in (1, 2, 3) for e in edges]
    random.Random(seed).shuffle(stream)
    truth = brute_force_join(cq.query, {f"G{i}": edges for i in (1, 2, 3)})
    eng = SJoin(cq.query, len(truth) + 5, seed=seed).run(stream)
    assert eng.total_delta == len(truth)
    assert set(eng.sample) == truth


@settings(max_examples=30, deadline=None)
@given(
    n=st.integers(0, 120),
    mod=st.integers(1, 7),
    k=st.integers(1, 15),
    seed=st.integers(0, 10**6),
)
def test_rswp_sample_invariants(n, mod, k, seed):
    items = list(range(n))
    theta = lambda x: x % mod == 0
    s, _ = reservoir_with_predicate(items, k, theta, seed=seed)
    reals = [x for x in items if theta(x)]
    assert len(s) == min(k, len(reals))
    assert len(set(s)) == len(s)
    assert set(s) <= set(reals)


@settings(max_examples=30, deadline=None)
@given(
    n=st.integers(1, 80),
    cuts=st.lists(st.integers(0, 80), max_size=5),
    k=st.integers(1, 8),
    seed=st.integers(0, 10**6),
)
def test_batch_boundaries_never_change_behaviour(n, cuts, k, seed):
    items = list(range(n))
    theta = lambda x: x % 2 == 0
    ref, _ = reservoir_with_predicate(items, k, theta, seed=seed)
    br = BatchReservoir(k, theta, rng=random.Random(seed))
    bounds = sorted(min(c, n) for c in cuts) + [n]
    start = 0
    for b in bounds:
        br.process_batch(ListBatch(items[start:b]))
        start = b
    assert br.sample == ref


@settings(max_examples=30, deadline=None)
@given(
    a=st.text(alphabet="abc", max_size=12),
    b=st.text(alphabet="abc", max_size=12),
    c=st.text(alphabet="abc", max_size=12),
)
def test_edit_distance_is_a_metric(a, b, c):
    assert edit_distance(a, b) == edit_distance(b, a)
    assert (edit_distance(a, b) == 0) == (a == b)
    assert edit_distance(a, c) <= edit_distance(a, b) + edit_distance(b, c)
