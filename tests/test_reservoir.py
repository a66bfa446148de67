"""Tests for Section 3: reservoir sampling with a predicate (Algorithms 1/4/5)."""
import math
import random

import pytest

from repro.core.reservoir import (
    BatchReservoir,
    ListBatch,
    classic_reservoir,
    reservoir_with_predicate,
    skip_reservoir,
)


def _inclusion_counts(run_once, universe, runs, seed0=0):
    counts = {u: 0 for u in universe}
    for m in range(runs):
        for x in run_once(seed0 + m):
            counts[x] += 1
    return counts


def _assert_uniform(counts, k, n, runs, sigmas=6.0):
    """Each item's inclusion count should be ~ Binomial(runs, k/n)."""
    p = min(1.0, k / n)
    mean = runs * p
    std = math.sqrt(runs * p * (1 - p)) if p < 1 else 0.0
    for u, c in counts.items():
        assert abs(c - mean) <= sigmas * std + 1, (
            f"item {u}: count {c}, expected ~{mean:.1f} ± {sigmas}σ ({std:.1f})"
        )


# ---------------------------------------------------------------- classic RS


@pytest.mark.parametrize("n,k", [(1, 1), (5, 5), (10, 3), (100, 10), (3, 7)])
def test_classic_sizes(n, k):
    s, _ = classic_reservoir(range(n), k, seed=0)
    assert len(s) == min(n, k)
    assert len(set(s)) == len(s)
    assert set(s) <= set(range(n))


def test_classic_full_when_k_ge_n():
    s, _ = classic_reservoir(range(7), 20, seed=1)
    assert sorted(s) == list(range(7))


def test_classic_uniform():
    n, k, runs = 40, 10, 3000
    counts = _inclusion_counts(
        lambda sd: classic_reservoir(range(n), k, seed=sd)[0], range(n), runs
    )
    _assert_uniform(counts, k, n, runs)


def test_classic_with_predicate_filters():
    n, k = 100, 8
    s, stats = classic_reservoir(range(n), k, theta=lambda x: x % 3 == 0, seed=2)
    assert all(x % 3 == 0 for x in s)
    assert stats.n_theta == n  # RS baseline evaluates θ on every item


def test_classic_with_predicate_uniform_over_reals():
    n, k, runs = 90, 6, 3000
    reals = [x for x in range(n) if x % 3 == 0]
    counts = _inclusion_counts(
        lambda sd: classic_reservoir(range(n), k, theta=lambda x: x % 3 == 0, seed=sd)[0],
        reals,
        runs,
    )
    _assert_uniform(counts, k, len(reals), runs)


# ---------------------------------------------------------------- skip-based


@pytest.mark.parametrize("n,k", [(10, 3), (1000, 10), (5, 5), (3, 9)])
def test_skip_reservoir_sizes(n, k):
    s, _ = skip_reservoir(list(range(n)), k, seed=0)
    assert len(s) == min(n, k)
    assert len(set(s)) == len(s)


def test_skip_reservoir_uniform():
    n, k, runs = 50, 10, 3000
    counts = _inclusion_counts(
        lambda sd: skip_reservoir(list(range(n)), k, seed=sd)[0], range(n), runs
    )
    _assert_uniform(counts, k, n, runs)


def test_skip_reservoir_few_stops():
    """O(k log(N/k)) stops, not O(N)."""
    n, k = 200_000, 50
    tot = 0
    for sd in range(5):
        _, stats = skip_reservoir(list(range(n)), k, seed=sd)
        tot += stats.n_skip
    avg = tot / 5
    expect = k * math.log(n / k)  # ≈ 415
    assert avg < 4 * expect
    assert avg < n / 50


# ------------------------------------------------------- Algorithm 1 (RSWP)


@pytest.mark.parametrize("density_mod", [1, 2, 5])
@pytest.mark.parametrize("k", [1, 4, 12])
def test_rswp_membership(density_mod, k):
    n = 300
    theta = lambda x: x % density_mod == 0
    s, _ = reservoir_with_predicate(list(range(n)), k, theta, seed=0)
    reals = [x for x in range(n) if theta(x)]
    assert len(s) == min(k, len(reals))
    assert len(set(s)) == len(s)
    assert all(theta(x) for x in s)


def test_rswp_all_dummy():
    s, stats = reservoir_with_predicate(list(range(100)), 5, lambda x: False, seed=0)
    assert s == []
    # reservoir never fills → every item goes through next(), none skipped
    assert stats.n_next == 100 and stats.n_skip == 0


def test_rswp_k_exceeds_reals():
    theta = lambda x: x % 10 == 0
    s, _ = reservoir_with_predicate(list(range(100)), 50, theta, seed=0)
    assert sorted(s) == [x for x in range(100) if theta(x)]


@pytest.mark.parametrize("density_mod", [1, 3])
def test_rswp_uniform(density_mod):
    n, k, runs = 60, 8, 3000
    theta = lambda x: x % density_mod == 0
    reals = [x for x in range(n) if theta(x)]
    counts = _inclusion_counts(
        lambda sd: reservoir_with_predicate(list(range(n)), k, theta, seed=sd)[0],
        reals,
        runs,
    )
    _assert_uniform(counts, k, len(reals), runs)


def test_rswp_uniform_sparse_tail():
    """Reals clustered at the end — stresses the dense-prefix/sparse logic."""
    n, k, runs = 80, 5, 4000
    theta = lambda x: x >= n - 20
    reals = list(range(n - 20, n))
    counts = _inclusion_counts(
        lambda sd: reservoir_with_predicate(list(range(n)), k, theta, seed=sd)[0],
        reals,
        runs,
    )
    _assert_uniform(counts, k, len(reals), runs)


def test_rswp_stop_complexity():
    """#stops ≈ Σ_{i≥p} k/(r_i+1) (Theorem 3.2), ≪ N on a dense stream."""
    n, k, runs = 100_000, 20, 5
    tot = 0
    for sd in range(runs):
        _, stats = reservoir_with_predicate(list(range(n)), k, lambda x: True, seed=sd)
        tot += stats.n_skip
    avg = tot / runs
    expect = sum(k / (i + 1) for i in range(k, n))  # r_i = i for all-real
    assert avg < 4 * expect + 10
    assert avg < n / 100


def test_rswp_degrades_to_linear_on_sparse():
    """With one real item at the end, the algorithm must not have skipped it."""
    n = 2000
    for sd in range(20):
        items = list(range(n))
        theta = lambda x: x == n - 1
        s, _ = reservoir_with_predicate(items, 3, theta, seed=sd)
        assert s == [n - 1]


# ---------------------------------------------------- Algorithms 4/5 (batch)


def _run_batched(items, k, theta, splits, seed):
    br = BatchReservoir(k, theta, rng=random.Random(seed))
    start = 0
    for end in list(splits) + [len(items)]:
        br.process_batch(ListBatch(items[start:end]))
        start = end
    return br


@pytest.mark.parametrize(
    "splits",
    [[], [0], [50], [10, 20, 30], [0, 0, 99], [1] * 5, list(range(0, 100, 7))],
)
def test_batched_equals_unbatched_pathwise(splits):
    """Batch boundaries must not change behaviour: with the same RNG the
    batched run is bit-identical to the single-batch run (Section 3.3)."""
    items = list(range(100))
    theta = lambda x: x % 2 == 0
    k = 7
    for seed in range(10):
        ref, _ = reservoir_with_predicate(items, k, theta, seed=seed)
        got = _run_batched(items, k, theta, splits, seed).sample
        assert got == ref


def test_batched_w_initialized_once():
    br = BatchReservoir(3, lambda x: True, seed=0)
    br.process_batch(ListBatch([1]))
    assert br.w == math.inf  # not full yet
    br.process_batch(ListBatch([2, 3]))
    assert br.w <= 1.0  # filled → initialized
    w_after = br.w
    br.process_batch(ListBatch([]))
    assert br.w == w_after  # never re-initialized


def test_batched_carries_skip_budget():
    """Skip budget q spans batches: leftover q decreases by batch size."""
    br = BatchReservoir(2, lambda x: True, seed=3)
    br.process_batch(ListBatch(list(range(50))))
    q0 = br.q
    br.process_batch(ListBatch([None] * min(q0, 5)))  # fully skipped batch
    assert br.q == q0 - min(q0, 5)


def test_batched_uniform_across_batches():
    n, k, runs = 60, 6, 3000
    items = list(range(n))
    counts = {u: 0 for u in items}
    for sd in range(runs):
        br = _run_batched(items, k, lambda x: True, [7, 13, 30, 31, 55], sd)
        for x in br.sample:
            counts[x] += 1
    _assert_uniform(counts, k, n, runs)


def test_batched_empty_and_dummyonly_batches():
    br = BatchReservoir(4, lambda x: x is not None, seed=0)
    br.process_batch(ListBatch([]))
    br.process_batch(ListBatch([None, None]))
    assert br.sample == []
    br.process_batch(ListBatch([1, None, 2, 3, None, 4, 5]))
    assert len(br.sample) == 4 and len(set(br.sample)) == 4
    assert set(br.sample) <= {1, 2, 3, 4, 5}


def test_listbatch_protocol():
    b = ListBatch([10, 11, 12, 13])
    assert b.remain() == 4
    assert b.next() == 10
    assert b.skip(1) == 12  # skips 11
    assert b.remain() == 1
    assert b.skip(5) is None
    assert b.remain() == 0


def test_rejects_bad_k():
    with pytest.raises(ValueError):
        BatchReservoir(0, lambda x: True, seed=0)
