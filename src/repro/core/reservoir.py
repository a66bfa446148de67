"""Reservoir sampling algorithms (paper Section 3).

Implemented here:

- ``classic_reservoir`` — Waterman's O(N) algorithm (Section 3.1, Step 1/2).
  With a predicate it becomes the paper's "RS" baseline of Section 6.3: the
  predicate is evaluated on *every* item.
- ``skip_reservoir`` — Li's [24] skip-based O(k log(N/k)) algorithm over a
  randomly-accessible sequence (used as a reference implementation in tests).
- ``reservoir_with_predicate`` — Algorithm 1: the paper's new reservoir
  sampler that maintains k uniform samples of the *real* items (those passing
  the predicate) while skipping runs of items, at instance-optimal cost
  ``O(Σ min(1, k/(r_i+1)))``.
- ``BatchReservoir`` — Algorithms 4/5 (BatchReservoir / BatchUpdate): the
  batched form used by reservoir sampling over joins, with the skip budget
  ``q`` carried across item-disjoint batches and ``w`` initialized exactly
  once, the first time the reservoir fills.

Batches implement the three primitives of Section 3.3/3.4:

- ``remain()`` — number of items not yet consumed;
- ``skip(q)``  — consume q items and return the (q+1)-th, or None;
- ``next()``   — ``skip(0)``.
"""
from __future__ import annotations

import math
import random
from dataclasses import dataclass, field
from typing import Any, Callable, Iterable, Protocol, Sequence

_HUGE_SKIP = 1 << 62  # "skip forever": w underflowed to 0


def _pow_1_over_k(rng: random.Random, k: int) -> float:
    """Draw u^(1/k) for u ~ Uni(0,1]; (0,1] avoids log(0) downstream."""
    return (1.0 - rng.random()) ** (1.0 / k)


def _geo(rng: random.Random, w: float) -> int:
    """q = floor(ln(U)/ln(1-w)) ~ Geo(w): number of failures before a
    Uni(0,1) draw falls below w."""
    if w <= 0.0:
        return _HUGE_SKIP
    den = math.log1p(-w)
    if den == 0.0:  # w rounded to 0 in log1p — cannot stop anymore
        return _HUGE_SKIP
    num = math.log(1.0 - rng.random())  # ln U, U in (0,1]
    q = int(num / den)
    return q if q < _HUGE_SKIP else _HUGE_SKIP


class Batch(Protocol):
    """Positional-access batch protocol (Section 3.3/3.4 primitives)."""

    def remain(self) -> int: ...

    def next(self) -> Any: ...

    def skip(self, q: int) -> Any: ...


class ListBatch:
    """A batch over an in-memory sequence (tests, Section 6.3 streams)."""

    __slots__ = ("items", "pos")

    def __init__(self, items: Sequence[Any]):
        self.items = items
        self.pos = 0  # number of items already consumed

    def remain(self) -> int:
        return len(self.items) - self.pos

    def next(self) -> Any:
        return self.skip(0)

    def skip(self, q: int) -> Any:
        target = self.pos + q
        if target >= len(self.items):
            self.pos = len(self.items)
            return None
        self.pos = target + 1
        return self.items[target]


@dataclass
class SamplerStats:
    """Instrumentation for the complexity claims of Theorems 3.2/3.9."""

    n_next: int = 0  # invocations of next() (the α term)
    n_skip: int = 0  # invocations of skip() (the γ term; "stops")
    n_theta: int = 0  # predicate evaluations
    n_batches: int = 0  # BatchUpdate invocations (the m term)


class BatchReservoir:
    """Algorithms 4/5: batched reservoir sampling with a predicate.

    Feed item-disjoint batches via :meth:`process_batch`; ``sample`` is at
    all times a uniform sample without replacement of size ≤ k of every real
    item seen so far. ``w`` starts at +inf (sentinel) so that it is
    initialized exactly once, when the reservoir first fills (Section 3.3).
    """

    def __init__(self, k: int, theta: Callable[[Any], bool], *, rng: random.Random | None = None, seed: int | None = None):
        if k <= 0:
            raise ValueError("sample size k must be positive")
        self.k = k
        self.theta = theta
        self.rng = rng if rng is not None else random.Random(seed)
        self.sample: list[Any] = []
        self.w: float = math.inf
        self.q: int = 0
        self.stats = SamplerStats()

    def process_batch(self, batch: Batch) -> None:
        """Algorithm 5 (BatchUpdate) on one batch."""
        S, k, rng, theta, stats = self.sample, self.k, self.rng, self.theta, self.stats
        stats.n_batches += 1
        # Line 1-3: fill the reservoir with real items.
        while len(S) < k and batch.remain() > 0:
            x = batch.next()
            stats.n_next += 1
            stats.n_theta += 1
            if theta(x):
                S.append(x)
        if len(S) < k:
            return  # line 4
        if self.w > 1.0:  # line 5-7: first-time initialization of w, q
            self.w = _pow_1_over_k(rng, k)
            self.q = _geo(rng, self.w)
        # Line 8-14: skip-replace loop. q is redrawn after EVERY stop (the
        # stop itself is the "successful trial" u < w of Algorithm 2, real or
        # dummy); w is updated only when the stop lands on a real item.
        while batch.remain() > self.q:
            x = batch.skip(self.q)
            stats.n_skip += 1
            stats.n_theta += 1
            if theta(x):
                S[rng.randrange(k)] = x
                self.w *= _pow_1_over_k(rng, k)
            self.q = _geo(rng, self.w)
        # Line 15: carry the unused skip budget into the next batch.
        self.q -= batch.remain()


class Reservoir(BatchReservoir):
    """Algorithm 1: reservoir sampling with a predicate over a single stream.

    The stream is just one batch; provided as a separate name to mirror the
    paper's presentation (Algorithm 1 is Algorithm 5 with one batch whose
    ``skip`` may run off the end).
    """

    def run(self, stream: Batch) -> list[Any]:
        self.process_batch(stream)
        return self.sample


def reservoir_with_predicate(
    items: Sequence[Any],
    k: int,
    theta: Callable[[Any], bool],
    *,
    seed: int | None = None,
    rng: random.Random | None = None,
) -> tuple[list[Any], SamplerStats]:
    """Run Algorithm 1 over an in-memory stream; returns (sample, stats)."""
    r = Reservoir(k, theta, rng=rng, seed=seed)
    r.run(ListBatch(items))
    return r.sample, r.stats


def classic_reservoir(
    items: Iterable[Any],
    k: int,
    *,
    theta: Callable[[Any], bool] | None = None,
    seed: int | None = None,
    rng: random.Random | None = None,
) -> tuple[list[Any], SamplerStats]:
    """Waterman's classic O(N) reservoir sampling (Section 3.1).

    With ``theta`` it is the "RS" baseline of Section 6.3: the predicate is
    evaluated on every single item, and only passing items are fed to the
    reservoir.
    """
    rng = rng if rng is not None else random.Random(seed)
    stats = SamplerStats()
    S: list[Any] = []
    i = 0  # number of real items seen
    for x in items:
        stats.n_next += 1
        if theta is not None:
            stats.n_theta += 1
            if not theta(x):
                continue
        i += 1
        if len(S) < k:
            S.append(x)
            continue
        j = rng.randrange(i)  # uniform in [0, i)
        if j < k:
            S[j] = x
    return S, stats


def skip_reservoir(
    items: Sequence[Any],
    k: int,
    *,
    seed: int | None = None,
    rng: random.Random | None = None,
) -> tuple[list[Any], SamplerStats]:
    """Li's [24] skip-based O(k log(N/k)) reservoir sampling (Section 3.1),
    over a randomly-accessible sequence (skip(i) is O(1))."""
    rng = rng if rng is not None else random.Random(seed)
    stats = SamplerStats()
    n = len(items)
    S = list(items[: min(k, n)])
    stats.n_next += len(S)
    if len(S) < k:
        return S, stats
    w = _pow_1_over_k(rng, k)
    pos = k
    while True:
        q = _geo(rng, w)
        if pos + q >= n:
            break
        pos += q
        S[rng.randrange(k)] = items[pos]
        stats.n_skip += 1
        pos += 1
        w *= _pow_1_over_k(rng, k)
    return S, stats
