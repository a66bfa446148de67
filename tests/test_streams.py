"""Tests for stream density utilities and the Fig 12/13 predicate streams."""
import random

import pytest

from repro.core.streams import (
    cartesian_flags,
    concat_flags,
    density,
    edit_distance,
    make_string_stream,
    pad_flags,
)


def _ref_edit_distance(a: str, b: str) -> int:
    """Plain O(nm) reference DP."""
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]


# ----------------------------------------------------------------- density


def test_density_trivial():
    assert density([]) == 1.0
    assert density([True]) == 1.0
    assert density([False]) == 1.0  # prefix of length 0 only constraint


def test_density_examples():
    assert density([True, True, False, True]) == pytest.approx(2 / 3)
    assert density([False, True, True, True]) == 0.0
    assert density([True] * 10) == 1.0


@pytest.mark.parametrize("seed", range(8))
def test_lemma_concat(seed):
    rng = random.Random(seed)
    s1 = [rng.random() < 0.8 for _ in range(rng.randrange(1, 40))]
    s1[0] = True  # keep φ1 > 0
    s2 = [rng.random() < 0.5 for _ in range(rng.randrange(1, 40))]
    s2[0] = True
    phi = density(concat_flags(s1, s2))
    assert phi >= min(density(s1), density(s2)) - 1e-12


@pytest.mark.parametrize("seed", range(8))
def test_lemma_cartesian(seed):
    rng = random.Random(seed)
    s1 = [True] + [rng.random() < 0.7 for _ in range(rng.randrange(1, 15))]
    s2 = [True] + [rng.random() < 0.7 for _ in range(rng.randrange(1, 15))]
    phi = density(cartesian_flags(s1, s2))
    assert phi >= density(s1) * density(s2) / 2 - 1e-12


@pytest.mark.parametrize("seed", range(8))
def test_lemma_padding(seed):
    rng = random.Random(seed)
    m = rng.randrange(1, 30)
    s = [True] + [rng.random() < 0.8 for _ in range(m - 1)]
    n_dummy = rng.randrange(0, m + 1)
    phi = density(pad_flags(s, n_dummy))
    assert phi >= density(s) * m / (m + n_dummy) - 1e-12


# ----------------------------------------------------------- edit distance


@pytest.mark.parametrize(
    "a,b,d",
    [
        ("", "", 0),
        ("abc", "abc", 0),
        ("abc", "", 3),
        ("", "xy", 2),
        ("kitten", "sitting", 3),
        ("flaw", "lawn", 2),
        ("abcdef", "azced", 3),
    ],
)
def test_edit_distance_known(a, b, d):
    assert edit_distance(a, b) == d


@pytest.mark.parametrize("seed", range(10))
def test_edit_distance_matches_reference(seed):
    rng = random.Random(seed)
    n = rng.randrange(0, 25)
    m = rng.randrange(0, 25)
    a = "".join(rng.choice("abcd") for _ in range(n))
    b = "".join(rng.choice("abcd") for _ in range(m))
    assert edit_distance(a, b) == _ref_edit_distance(a, b)


def test_edit_distance_symmetry_and_bounds():
    rng = random.Random(7)
    for _ in range(5):
        a = "".join(rng.choice("ab") for _ in range(15))
        b = "".join(rng.choice("ab") for _ in range(12))
        d = edit_distance(a, b)
        assert d == edit_distance(b, a)
        assert abs(len(a) - len(b)) <= d <= max(len(a), len(b))


# ------------------------------------------------------- string streams


@pytest.mark.parametrize("dens", [0.0, 0.1, 0.5, 1.0])
def test_make_string_stream_flags_match_theta(dens):
    items, theta, flags = make_string_stream(120, dens, seed=1, length=64)
    assert len(items) == len(flags) == 120
    assert [theta(s) for s in items] == flags


def test_make_string_stream_density_approx():
    n = 400
    items, _, flags = make_string_stream(n, 0.25, seed=2, length=48)
    assert abs(sum(flags) / n - 0.25) < 0.02
    # evenly spread → every sizeable prefix is roughly 0.25-dense
    assert density(flags) >= 0.1


def test_make_string_stream_deterministic():
    a = make_string_stream(50, 0.3, seed=9, length=32)[0]
    b = make_string_stream(50, 0.3, seed=9, length=32)[0]
    assert a == b
