"""Cyclic joins via generalized hypertree decomposition (Section 5),
instantiated for the paper's dumbbell query (Fig 4):

    Q = G1(x1,x2) ⋈ G2(x2,x3) ⋈ G3(x3,x1)            -- triangle 1
      ⋈ G4(x4,x5) ⋈ G5(x5,x6) ⋈ G6(x6,x4)            -- triangle 2
      ⋈ G7(x1,x4)                                     -- connector

GHD: three bags — T1 = {x1,x2,x3} (triangle 1), C = {x1,x4} (G7),
T2 = {x4,x5,x6} (triangle 2) — forming the acyclic super-query
``T1(x1,x2,x3) ⋈ C(x1,x4) ⋈ T2(x4,x5,x6)`` (width 1.5).

Each arriving edge of a triangle's relation produces its delta sub-query
results Δ_u (new triangles containing that edge, found by neighbourhood
intersection — the AGM-bounded step), and every delta tuple is pushed
through lines 5-7 of Algorithm 6 on the acyclic super-query, exactly as
Section 5 prescribes. Connector edges go straight through.
"""
from __future__ import annotations

import random
from typing import Iterable, Sequence

from repro.joins.query import JoinQuery
from repro.joins.rsjoin import RSJoin

DUMBBELL_SQL = (
    "SELECT g1.src AS X1, g1.dst AS X2, g2.dst AS X3, "
    "g7.dst AS X4, g4.dst AS X5, g5.dst AS X6 "
    "FROM G AS g1, G AS g2, G AS g3, G AS g4, G AS g5, G AS g6, G AS g7 "
    "WHERE g1.dst = g2.src AND g2.dst = g3.src AND g3.dst = g1.src "
    "AND g4.dst = g5.src AND g5.dst = g6.src AND g6.dst = g4.src "
    "AND g7.src = g1.src AND g7.dst = g4.src"
)


class _TriangleTracker:
    """Incremental directed-triangle maintenance for one GHD bag
    E1(a,b) ⋈ E2(b,c) ⋈ E3(c,a): on inserting an edge into any E_i, the new
    triangles are a neighbourhood intersection (worst-case-optimal delta)."""

    def __init__(self):
        # per relation copy: out[src] = {dst}, in_[dst] = {src}
        self.out = [dict() for _ in range(3)]
        self.in_ = [dict() for _ in range(3)]
        self.edges = [set() for _ in range(3)]

    def insert(self, i: int, a, b) -> list[tuple]:
        """Insert (a, b) into E_{i+1}; return new (x1, x2, x3) triangles."""
        if (a, b) in self.edges[i]:
            return []
        self.edges[i].add((a, b))
        self.out[i].setdefault(a, set()).add(b)
        self.in_[i].setdefault(b, set()).add(a)
        if i == 0:  # (x1,x2)=(a,b): need c with (b,c)∈E2 and (c,a)∈E3
            s1 = self.out[1].get(b, set())
            s2 = self.in_[2].get(a, set())
            return [(a, b, c) for c in (s1 & s2)]
        if i == 1:  # (x2,x3)=(a,b): need x1 with (x1,a)∈E1 and (b,x1)∈E3
            s1 = self.in_[0].get(a, set())
            s2 = self.out[2].get(b, set())
            return [(x1, a, b) for x1 in (s1 & s2)]
        # i == 2: (x3,x1)=(a,b): need x2 with (b,x2)∈E1 and (x2,a)∈E2
        s1 = self.out[0].get(b, set())
        s2 = self.in_[1].get(a, set())
        return [(b, x2, a) for x2 in (s1 & s2)]


DUMBBELL_SUPER_QUERY = JoinQuery.of(
    T1=("X1", "X2", "X3"), C=("X1", "X4"), T2=("X4", "X5", "X6")
)


class DumbbellRSJoin:
    """RSJoin for the dumbbell join: GHD materialization of the two triangle
    bags feeding Algorithm 6 on the acyclic super-query."""

    # which (bag, E-index) each of the 7 relation copies maps to
    _ROUTE = {
        "G1": ("t1", 0), "G2": ("t1", 1), "G3": ("t1", 2),
        "G4": ("t2", 0), "G5": ("t2", 1), "G6": ("t2", 2),
        "G7": ("c", None),
    }
    OCCURRENCES = tuple(_ROUTE)

    def __init__(self, k: int, *, seed: int = 0, grouping: bool = False, sampling: bool = True):
        self.engine = RSJoin(
            DUMBBELL_SUPER_QUERY, k, seed=seed, grouping=grouping, sampling=sampling
        )
        self.t1 = _TriangleTracker()
        self.t2 = _TriangleTracker()
        self.n_inserted = 0

    def insert(self, occ: str, edge: Sequence) -> None:
        bag, i = self._ROUTE[occ]
        a, b = edge
        self.n_inserted += 1
        if bag == "c":
            self.engine.insert("C", (a, b))
            return
        tracker = self.t1 if bag == "t1" else self.t2
        rel = "T1" if bag == "t1" else "T2"
        for tri in tracker.insert(i, a, b):
            self.engine.insert(rel, tri)

    def run(self, stream: Iterable[tuple[str, Sequence]]) -> "DumbbellRSJoin":
        for occ, edge in stream:
            self.insert(occ, edge)
        return self

    @property
    def sample(self) -> list[tuple]:
        """Samples as (X1..X6) tuples (the super-query's attribute order)."""
        return self.engine.sample

    @property
    def prop_count(self) -> int:
        return self.engine.prop_count


def dumbbell_stream(edges: Iterable[tuple], *, seed: int = 0) -> list[tuple[str, tuple]]:
    """All 7 relation copies of the edge set, globally shuffled (Section 6.1)."""
    rng = random.Random(seed)
    items = [(occ, tuple(e)) for occ in DumbbellRSJoin.OCCURRENCES for e in edges]
    rng.shuffle(items)
    return items
