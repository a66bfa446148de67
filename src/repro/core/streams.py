"""Stream utilities for Section 3 and the Section 6.3 experiments.

Density (Definition 3.4): a stream is φ-dense if, for every prefix, the
number of real items in the first i-1 items is ≥ φ·(i-1). Helpers here
measure density and build the composite streams of Lemmas 3.6-3.8
(concatenation, Cartesian product, dummy padding), plus the edit-distance
string streams used by Figures 12/13.

Substitution note (DESIGN.md): the paper uses 1024-char strings with an
edit-distance-16-of-64 predicate, evaluated in C++. We default to 192-char
strings with proportionally scaled distances — the experiment only needs a
predicate with a non-trivial per-evaluation cost, since it contrasts
evaluating θ on every item (RS) vs only on skip-stops (RSWP).
"""
from __future__ import annotations

import random
import string
from typing import Callable, Sequence

import numpy as np


def density(real_flags: Sequence[bool]) -> float:
    """The largest φ such that the stream is φ-dense (1.0 for empty/len-1)."""
    phi = 1.0
    reals = 0
    for i, f in enumerate(real_flags):  # prefix of length i has `reals` reals
        if i > 0:
            phi = min(phi, reals / i)
        reals += 1 if f else 0
    return phi


def concat_flags(s1: Sequence[bool], s2: Sequence[bool]) -> list[bool]:
    """Lemma 3.6: concatenation preserves min density."""
    return list(s1) + list(s2)


def cartesian_flags(s1: Sequence[bool], s2: Sequence[bool]) -> list[bool]:
    """Lemma 3.7: row-major product; (x,y) real iff both real."""
    return [a and b for a in s1 for b in s2]


def pad_flags(s: Sequence[bool], n_dummy: int) -> list[bool]:
    """Lemma 3.8: append n dummy items."""
    return list(s) + [False] * n_dummy


def edit_distance(a: str, b: str, band: int | None = None) -> int:
    """Levenshtein distance with a vectorized (numpy) row DP.

    ``band`` (optional) is only used to pick a cheap early answer when the
    length difference alone exceeds it; the DP itself is full-width, which at
    our string lengths is fast enough and keeps the code simple.
    """
    if a == b:
        return 0
    if band is not None and abs(len(a) - len(b)) > band:
        return abs(len(a) - len(b))
    xa = np.frombuffer(a.encode("latin-1"), dtype=np.uint8)
    xb = np.frombuffer(b.encode("latin-1"), dtype=np.uint8)
    m = xb.size
    idx = np.arange(m + 1, dtype=np.int32)
    prev = idx.copy()
    for i, ca in enumerate(xa, start=1):
        # Tentative row: cell 0 is i; cell j (1..m) is min(substitution,
        # deletion). The insertion dependency cur[j] = min(., cur[j-1]+1)
        # closes under "min over any left cell l of tentative[l] + (j-l)",
        # computed vectorized as a running min of (tentative - index).
        tent = np.empty(m + 1, dtype=np.int32)
        tent[0] = i
        np.minimum(prev[:-1] + (xb != ca), prev[1:] + 1, out=tent[1:])
        shifted = tent - idx
        np.minimum.accumulate(shifted, out=shifted)
        prev = shifted + idx
    return int(prev[-1])


def _mutate(rng: random.Random, s: str, n_edits: int, alphabet: str) -> str:
    """Apply n single-character edits (sub/ins/del) to s."""
    chars = list(s)
    for _ in range(n_edits):
        op = rng.randrange(3)
        if op == 0 and chars:  # substitute
            chars[rng.randrange(len(chars))] = rng.choice(alphabet)
        elif op == 1:  # insert
            chars.insert(rng.randrange(len(chars) + 1), rng.choice(alphabet))
        elif chars:  # delete
            del chars[rng.randrange(len(chars))]
    return "".join(chars)


def make_string_stream(
    n: int,
    density: float,
    *,
    seed: int = 0,
    length: int = 192,
    threshold: int | None = None,
) -> tuple[list[str], Callable[[str], bool], list[bool]]:
    """Build the Fig 12/13 stream: items within small edit distance of a fixed
    query string are real; far-away random strings are dummy.

    Returns ``(items, theta, real_flags)`` where ``theta`` computes the edit
    distance against the query string (the deliberately expensive predicate).
    Real items are placed so the stream is approximately ``density``-dense
    (spread evenly, dummies in between).
    """
    rng = random.Random(seed)
    alphabet = string.ascii_lowercase
    if threshold is None:
        threshold = max(2, length // 12)  # 16-of-1024 scaled
    query = "".join(rng.choice(alphabet) for _ in range(length))

    n_real = round(n * density)
    flags = [False] * n
    if n_real > 0:
        step = n / n_real
        for j in range(n_real):  # even spread keeps every prefix ~density-dense
            flags[min(n - 1, int(j * step))] = True
    items = []
    for f in flags:
        if f:
            items.append(_mutate(rng, query, rng.randrange(threshold // 2 + 1), alphabet))
        else:
            items.append("".join(rng.choice(alphabet) for _ in range(length)))

    def theta(s: str) -> bool:
        return edit_distance(s, query, band=threshold) <= threshold

    return items, theta, flags
