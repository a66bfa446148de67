"""SJoin — the state-of-the-art baseline of Zhao et al. [31] (Section 6.1),
re-implemented from its description.

SJoin follows the same framework as Algorithm 6 but uses the *classic*
reservoir sampler (no predicate), which forces its index to expose the exact
delta-query sizes and exact positional access to ``ΔQ(R, t)``:

- For every rooted join tree it maintains **exact** subtree counts
  ``W[e][t] = Σ_{t'∈R_e⋉t} Π_{c} W[c][π_key(c) t']`` with a per-stored-tuple
  weight cache.
- An insert propagates the exact count delta to *every* matching ancestor
  tuple on *every* update — ``O(N)`` per tuple in the worst case, ``O(N²)``
  total, which is exactly the behaviour the paper improves on (its power-of-2
  rounding makes propagation fire only on doublings).
- Batches contain no dummies (1-dense), so the plain skip-based reservoir
  applies; positional retrieval descends with linear prefix scans over the
  matching lists.
"""
from __future__ import annotations

import random
from typing import Iterable, Sequence

from repro.core.reservoir import BatchReservoir
from repro.joins.index import is_real
from repro.joins.query import JoinQuery, RootedTree

Tuple_ = tuple


def _proj(t, idx):
    return tuple(t[i] for i in idx)


class _Node:
    __slots__ = (
        "name", "rel", "parent", "children", "is_root", "is_leaf",
        "key_idx", "child_key_idx", "out_idx",
        "matches", "cnt", "by_child_key", "w_tup",
    )

    def __init__(self):
        self.matches: dict[Tuple_, list[Tuple_]] = {}
        self.cnt: dict[Tuple_, int] = {}
        self.by_child_key: dict[str, dict[Tuple_, list[Tuple_]]] = {}
        self.w_tup: dict[Tuple_, int] = {}  # exact weight cache per tuple


class ExactTreeIndex:
    """Exact-count index on one rooted join tree (the SJoin substrate)."""

    def __init__(self, tree: RootedTree):
        self.tree = tree
        self.query = tree.query
        self.prop_count = 0
        self.nodes: dict[str, _Node] = {}
        q = self.query
        for name in tree.order:
            rel = q.by_name[name]
            n = _Node()
            n.name = name
            n.rel = rel
            n.parent = tree.parent[name]
            n.children = list(tree.children[name])
            n.is_root = n.parent is None
            n.is_leaf = not n.children
            n.key_idx = rel.proj_idx(tree.key_attrs[name])
            n.child_key_idx = {c: rel.proj_idx(tree.key_attrs[c]) for c in n.children}
            n.out_idx = tuple(q.attrs.index(a) for a in rel.attrs)
            for c in n.children:
                n.by_child_key[c] = {}
            self.nodes[name] = n
        self._out_len = len(q.attrs)

    def _weight(self, node: _Node, t: Tuple_) -> int:
        w = 1
        for c in node.children:
            w *= self.nodes[c].cnt.get(_proj(t, node.child_key_idx[c]), 0)
            if w == 0:
                return 0
        return w

    def insert(self, rel_name: str, t: Tuple_) -> None:
        node = self.nodes[rel_name]
        if node.is_root:
            return
        key_t = _proj(t, node.key_idx)
        node.matches.setdefault(key_t, []).append(t)
        for c in node.children:
            node.by_child_key[c].setdefault(_proj(t, node.child_key_idx[c]), []).append(t)
        w = self._weight(node, t)
        node.w_tup[t] = w
        if w:
            self._bump(node, key_t, w)

    def _bump(self, node: _Node, key_t: Tuple_, delta: int) -> None:
        """Exact-count propagation: cnt[node][key_t] += delta, then update
        every matching parent tuple's cached weight — the O(N)-per-update
        hot loop of SJoin. Deltas are aggregated per parent key before
        recursing (otherwise the cost would be deg^depth, not the O(N) of
        [31]: many parent tuples share one parent key)."""
        node.cnt[key_t] = node.cnt.get(key_t, 0) + delta
        if node.is_root:
            return
        parent = self.nodes[node.parent]
        if parent.is_root:
            return
        acc: dict[Tuple_, int] = {}
        for t2 in parent.by_child_key[node.name].get(key_t, []):
            self.prop_count += 1
            others = 1
            for c in parent.children:
                if c == node.name:
                    continue
                others *= self.nodes[c].cnt.get(_proj(t2, parent.child_key_idx[c]), 0)
                if others == 0:
                    break
            d2 = delta * others
            if d2 == 0:
                continue
            parent.w_tup[t2] += d2
            pk = _proj(t2, parent.key_idx)
            acc[pk] = acc.get(pk, 0) + d2
        for pk, d in acc.items():
            self._bump(parent, pk, d)

    # --------------------------------------------------------- delta access

    def delta_size(self, root_tuple: Tuple_) -> int:
        root = self.nodes[self.tree.root]
        p = 1
        for c in root.children:
            p *= self.nodes[c].cnt.get(_proj(root_tuple, root.child_key_idx[c]), 0)
            if p == 0:
                return 0
        return p

    def retrieve_delta(self, root_tuple: Tuple_, z: int) -> Tuple_:
        root = self.nodes[self.tree.root]
        out = [None] * self._out_len
        for p, i in zip(root.out_idx, range(len(root_tuple))):
            out[p] = root_tuple[i]
        self._retrieve_children(root, root_tuple, z, out)
        return tuple(out)

    def _retrieve_children(self, node: _Node, t: Tuple_, z: int, out: list) -> None:
        for c in reversed(node.children):
            child = self.nodes[c]
            key_t = _proj(t, node.child_key_idx[c])
            s = child.cnt[key_t]
            z, zc = divmod(z, s)
            self._retrieve(child, key_t, zc, out)

    def _retrieve(self, node: _Node, key_t: Tuple_, z: int, out: list) -> None:
        if node.is_leaf:
            t = node.matches[key_t][z]
        else:
            t = None
            for cand in node.matches[key_t]:  # linear prefix scan
                w = node.w_tup[cand]
                if z < w:
                    t = cand
                    break
                z -= w
            assert t is not None, "position beyond exact mass"
        for p, i in zip(node.out_idx, range(len(t))):
            out[p] = t[i]
        if not node.is_leaf:
            self._retrieve_children(node, t, z, out)


class _ExactDeltaBatch:
    __slots__ = ("index", "root_tuple", "total", "consumed")

    def __init__(self, index: ExactTreeIndex, root_tuple: Tuple_):
        self.index = index
        self.root_tuple = root_tuple
        self.total = index.delta_size(root_tuple)
        self.consumed = 0

    def remain(self) -> int:
        return self.total - self.consumed

    def next(self):
        return self.skip(0)

    def skip(self, q: int):
        target = self.consumed + q
        if target >= self.total:
            self.consumed = self.total
            return None
        self.consumed = target + 1
        return self.index.retrieve_delta(self.root_tuple, target)


class SJoin:
    """Baseline engine: exact index + classic skip reservoir (all items real)."""

    def __init__(self, query: JoinQuery, k: int, *, seed: int = 0, sampling: bool = True):
        self.query = query
        self.k = k
        self.sampling = sampling
        self.trees = {r.name: ExactTreeIndex(query.rooted(r.name)) for r in query.relations}
        self.seen: dict[str, set] = {r.name: set() for r in query.relations}
        # is_real is a module-level function so engines stay picklable (the
        # Structured Streaming operator stores the engine in the state store)
        self.sampler = BatchReservoir(k, is_real, rng=random.Random(seed))
        self.n_inserted = 0
        self.total_delta = 0

    def insert(self, rel_name: str, values: Sequence) -> None:
        t = tuple(values)
        bucket = self.seen[rel_name]
        if t in bucket:
            return
        bucket.add(t)
        self.n_inserted += 1
        for tree in self.trees.values():
            tree.insert(rel_name, t)
        if not self.sampling:
            return
        batch = _ExactDeltaBatch(self.trees[rel_name], t)
        self.total_delta += batch.total
        self.sampler.process_batch(batch)

    def run(self, stream: Iterable[tuple[str, Sequence]]) -> "SJoin":
        for rel_name, values in stream:
            self.insert(rel_name, values)
        return self

    @property
    def sample(self) -> list[tuple]:
        return list(self.sampler.sample)

    @property
    def prop_count(self) -> int:
        return sum(t.prop_count for t in self.trees.values())
