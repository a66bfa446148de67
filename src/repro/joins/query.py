"""Join query hypergraph model (Section 2.1) and join trees (Definition 4.1).

A (natural) join query is a hypergraph: each relation occurrence is a named
hyperedge over a set of attributes; relations sharing an attribute name join
on it. SQL equi-join queries (Appendix A) are expressed by renaming columns
into equivalence-class attributes (e.g. line-3 ``G1.dst = G2.src`` becomes the
shared attribute ``B`` of ``R1(A,B)`` and ``R2(B,C)``).

Acyclicity is decided by the GYO ear-removal algorithm, which also yields a
join tree: an ear's witness becomes its tree neighbour.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Sequence


@dataclass(frozen=True)
class Relation:
    """One relation occurrence (hyperedge). ``name`` is unique in the query —
    self-joins use distinct occurrence names (G1, G2, ...) over the same data."""

    name: str
    attrs: tuple[str, ...]

    def __post_init__(self):
        if len(set(self.attrs)) != len(self.attrs):
            raise ValueError(f"duplicate attribute in relation {self.name}: {self.attrs}")

    def proj_idx(self, sub: Sequence[str]) -> tuple[int, ...]:
        """Positions of ``sub`` inside this relation's attribute tuple."""
        return tuple(self.attrs.index(a) for a in sub)


class JoinQuery:
    """A multi-way natural join query Q = (V, E)."""

    def __init__(self, relations: Iterable[Relation]):
        self.relations: tuple[Relation, ...] = tuple(relations)
        if not self.relations:
            raise ValueError("query needs at least one relation")
        names = [r.name for r in self.relations]
        if len(set(names)) != len(names):
            raise ValueError(f"duplicate relation names: {names}")
        self.by_name: dict[str, Relation] = {r.name: r for r in self.relations}
        # Global attribute order: first appearance across relations.
        seen: dict[str, None] = {}
        for r in self.relations:
            for a in r.attrs:
                seen.setdefault(a)
        self.attrs: tuple[str, ...] = tuple(seen)

    @classmethod
    def of(cls, **relations: Sequence[str]) -> "JoinQuery":
        """``JoinQuery.of(R1=("A","B"), R2=("B","C"))``."""
        return cls(Relation(n, tuple(a)) for n, a in relations.items())

    # ---------------------------------------------------------------- GYO

    def _gyo(self) -> tuple[bool, dict[str, str | None]]:
        """GYO ear removal. Returns (acyclic?, neighbour map) where each
        removed ear points at its witness (or None for the last relation)."""
        alive: dict[str, set[str]] = {r.name: set(r.attrs) for r in self.relations}
        neighbour: dict[str, str | None] = {}
        changed = True
        while len(alive) > 1 and changed:
            changed = False
            # attribute -> relations (among alive) containing it
            occ: dict[str, set[str]] = {}
            for n, attrs in alive.items():
                for a in attrs:
                    occ.setdefault(a, set()).add(n)
            for n in list(alive):
                attrs = alive[n]
                shared = {a for a in attrs if len(occ[a]) > 1}
                if not shared:
                    # isolated ear: attach anywhere (cartesian component)
                    witness = next((m for m in alive if m != n), None)
                else:
                    witness = None
                    for m, mattrs in alive.items():
                        if m != n and shared <= mattrs:
                            witness = m
                            break
                    if witness is None:
                        continue
                neighbour[n] = witness
                del alive[n]
                changed = True
                break  # occ is stale; recompute
        if len(alive) == 1:
            neighbour[next(iter(alive))] = None
            return True, neighbour
        return False, {}

    def is_acyclic(self) -> bool:
        return self._gyo()[0]

    def join_tree_edges(self) -> list[tuple[str, str]]:
        """Undirected join tree edges; raises on cyclic queries."""
        ok, neighbour = self._gyo()
        if not ok:
            raise ValueError("query is cyclic — no join tree exists")
        return [(n, w) for n, w in neighbour.items() if w is not None]

    def rooted(self, root: str) -> "RootedTree":
        """The join tree rooted at relation ``root`` (Section 4.3: one rooted
        tree per relation; the one rooted at R_r generates batches for R_r)."""
        if root not in self.by_name:
            raise KeyError(root)
        adj: dict[str, list[str]] = {r.name: [] for r in self.relations}
        for a, b in self.join_tree_edges():
            adj[a].append(b)
            adj[b].append(a)
        parent: dict[str, str | None] = {root: None}
        order = [root]
        stack = [root]
        while stack:
            u = stack.pop()
            for v in adj[u]:
                if v not in parent:
                    parent[v] = u
                    order.append(v)
                    stack.append(v)
        if len(order) != len(self.relations):
            raise AssertionError("join tree is disconnected")
        return RootedTree(self, root, parent, order)


@dataclass
class RootedTree:
    """A join tree rooted at ``root`` with parent/child maps and key(e) =
    e ∩ parent(e) (Section 4.3)."""

    query: JoinQuery
    root: str
    parent: dict[str, str | None]
    order: list[str]  # BFS/DFS order from the root (parents before children)
    children: dict[str, list[str]] = field(init=False)
    key_attrs: dict[str, tuple[str, ...]] = field(init=False)

    def __post_init__(self):
        self.children = {n: [] for n in self.parent}
        for n, p in self.parent.items():
            if p is not None:
                self.children[p].append(n)
        self.key_attrs = {}
        for n, p in self.parent.items():
            if p is None:
                self.key_attrs[n] = ()
            else:
                na = self.query.by_name[n].attrs
                pa = set(self.query.by_name[p].attrs)
                self.key_attrs[n] = tuple(a for a in na if a in pa)

    def subtree_size(self, e: str) -> int:
        """|T_e|: number of nodes in the subtree below (and including) e."""
        n = 1
        for c in self.children[e]:
            n += self.subtree_size(c)
        return n
