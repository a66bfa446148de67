"""The dynamic index for acyclic joins (Section 4.3) with the grouping
optimization (Section 4.4) — Algorithms 7 (IndexUpdate), 8 (BatchGenerate,
realized lazily via positional retrieval), 9 (Retrieve), 10/11 (grouping
variants).

One :class:`TreeIndex` serves one rooted join tree ``T``. For every non-root
node ``e`` and key tuple ``t ∈ π_key(e) R_e`` it maintains:

- ``matches[e][t]`` — the stored tuples of ``R_e ⋉ t`` (full tuples, or group
  tuples when ``e`` is grouped);
- ``cnt[e][t]``  — the upper bound on the degree of ``t`` in the subtree
  ``T_e``: ``Σ_{t'∈R_e⋉t} w(t')`` where
  ``w(t') = f̃eq(t') · Π_{c∈C_e} c̃nt[c][π_key(c) t']`` (``f̃eq ≡ 1`` when not
  grouped);
- ``c̃nt[e][t]`` — ``cnt`` rounded up to the next power of two;
- buckets ``Φ_{i,e}(t)`` — stored tuples whose weight is exactly ``2^i``
  (weights are products of powers of two, hence exact powers of two).

The batch ``ΔJ ⊇ ΔQ(R, t)`` for a tuple ``t`` inserted at the root is the
(never materialized) mixed-radix product of the children's padded sub-batches;
``retrieve_delta`` returns the join result at any position, or ``None`` for a
dummy, in ``O(log N)`` time.

With ``full_index=True`` the root is treated as one more bucketed node under
the empty key, so a uniform sample of the *current* ``Q(R)`` can be drawn in
``O(log N)`` expected time (Theorem 4.2 operation (2); see DESIGN.md for why
we maintain this directly instead of "concatenating all ΔJ's").
"""
from __future__ import annotations

import random
from typing import Any, Callable

from repro.joins.query import JoinQuery, RootedTree

Tuple_ = tuple  # stored tuples are plain value tuples


def next_pow2(x: int) -> int:
    """2^ceil(log2 x) for x ≥ 1; 0 for x ≤ 0."""
    return 1 << (x - 1).bit_length() if x > 0 else 0


class _Node:
    """Per-node state of a TreeIndex (one relation occurrence)."""

    __slots__ = (
        "name", "rel", "parent", "children", "is_root", "is_leaf",
        "key_idx", "grouped", "group_idx", "full_child_key_idx",
        "child_key_idx", "out_idx", "subtree_size",
        "matches", "cnt", "cntt", "buckets", "by_child_key",
        "members", "feq", "feqt",
    )

    def __init__(self):
        self.matches: dict[Tuple_, list[Tuple_]] = {}
        self.cnt: dict[Tuple_, int] = {}
        self.cntt: dict[Tuple_, int] = {}
        # buckets[key_t] = {i: (list of stored tuples, {tuple: position})}
        self.buckets: dict[Tuple_, dict[int, tuple[list, dict]]] = {}
        self.by_child_key: dict[str, dict[Tuple_, list[Tuple_]]] = {}
        self.members: dict[Tuple_, list[Tuple_]] = {}
        self.feq: dict[Tuple_, int] = {}
        self.feqt: dict[Tuple_, int] = {}


def _proj(t: Tuple_, idx: tuple[int, ...]) -> Tuple_:
    return tuple(t[i] for i in idx)


class TreeIndex:
    """Dynamic index for one rooted join tree (Theorem 4.2)."""

    def __init__(self, tree: RootedTree, *, grouping: bool = False, full_index: bool = False):
        self.tree = tree
        self.query: JoinQuery = tree.query
        self.grouping = grouping
        self.full_index = full_index
        self.prop_count = 0  # executions of the propagation loop (Fig 9 metric)
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
            n.subtree_size = tree.subtree_size(name)
            key = tree.key_attrs[name]
            # Attributes a stored tuple must carry: key(e) ∪ ⋃ key(children).
            join_attrs = list(key)
            for c in n.children:
                for a in tree.key_attrs[c]:
                    if a not in join_attrs:
                        join_attrs.append(a)
            maintain = (not n.is_root) or full_index
            n.grouped = (
                grouping
                and maintain
                and len(join_attrs) < len(rel.attrs)
            )
            stored_attrs = tuple(a for a in rel.attrs if a in join_attrs) if n.grouped else rel.attrs
            n.group_idx = rel.proj_idx(stored_attrs) if n.grouped else None
            n.key_idx = tuple(stored_attrs.index(a) for a in key)
            n.child_key_idx = {
                c: tuple(stored_attrs.index(a) for a in tree.key_attrs[c]) for c in n.children
            }
            n.full_child_key_idx = {c: rel.proj_idx(tree.key_attrs[c]) for c in n.children}
            n.out_idx = tuple(q.attrs.index(a) for a in rel.attrs)
            for c in n.children:
                n.by_child_key[c] = {}
            self.nodes[name] = n
        self._out_len = len(q.attrs)

    # ------------------------------------------------------------- updates

    def insert(self, rel_name: str, t: Tuple_) -> None:
        """Register tuple ``t`` (already deduplicated) in this tree's index;
        amortized O(log N) (Section 4.3 "Index Update")."""
        node = self.nodes[rel_name]
        if node.is_root and not self.full_index:
            return  # the root stores nothing: its batches come from children
        if not node.grouped:
            self._index_update(node, t, 0, is_new=True)
            return
        # Grouping (Algorithm 10): the stored tuple is the projection onto the
        # join attributes; its weight carries the f̃eq multiplier.
        g = _proj(t, node.group_idx)
        node.members.setdefault(g, []).append(t)
        f_old = node.feq.get(g, 0)
        node.feq[g] = f_old + 1
        ft_old = node.feqt.get(g, 0)
        ft_new = next_pow2(f_old + 1)
        if ft_new == ft_old:
            return  # weight unchanged: the new member rides on f̃eq slack
        node.feqt[g] = ft_new
        prod = self._child_prod(node, g, node.child_key_idx)
        self._index_update(node, g, ft_old * prod, is_new=(f_old == 0))

    def _child_prod(self, node: _Node, st: Tuple_, idx_map) -> int:
        p = 1
        for c in node.children:
            p *= self.nodes[c].cntt.get(_proj(st, idx_map[c]), 0)
            if p == 0:
                return 0
        return p

    def _index_update(self, node: _Node, st: Tuple_, old: int, is_new: bool = False) -> None:
        """Algorithm 7/10: stored tuple ``st``'s weight changed from ``old``;
        re-bucket it, update cnt/c̃nt, and propagate upward on c̃nt doubling."""
        key_t = _proj(st, node.key_idx)
        if is_new:
            node.matches.setdefault(key_t, []).append(st)
            for c in node.children:
                node.by_child_key[c].setdefault(_proj(st, node.child_key_idx[c]), []).append(st)
        f = node.feqt[st] if node.grouped else 1
        new = f * self._child_prod(node, st, node.child_key_idx)
        if new == old:
            return
        # Re-bucket (weights are exact powers of two).
        bk = node.buckets.setdefault(key_t, {})
        if old > 0:
            i_old = old.bit_length() - 1
            lst, pos = bk[i_old]
            p = pos.pop(st)
            last = lst.pop()
            if p < len(lst):
                lst[p] = last
                pos[last] = p
            if not lst:
                del bk[i_old]
        if new > 0:
            i_new = new.bit_length() - 1
            lst, pos = bk.setdefault(i_new, ([], {}))
            pos[st] = len(lst)
            lst.append(st)
        j_old = node.cntt.get(key_t, 0)
        node.cnt[key_t] = node.cnt.get(key_t, 0) + new - old
        j_new = next_pow2(node.cnt[key_t])
        if j_new == j_old:
            return
        node.cntt[key_t] = j_new
        if node.is_root:
            return
        parent = self.nodes[node.parent]
        if parent.is_root and not self.full_index:
            return  # nothing maintained above (Algorithm 7 line 8 guard)
        # Propagate: every parent stored tuple matching key_t moves buckets.
        for st2 in parent.by_child_key[node.name].get(key_t, []):
            self.prop_count += 1
            f2 = parent.feqt[st2] if parent.grouped else 1
            prod_others = 1
            for c in parent.children:
                if c == node.name:
                    continue
                prod_others *= self.nodes[c].cntt.get(
                    _proj(st2, parent.child_key_idx[c]), 0
                )
                if prod_others == 0:
                    break
            self._index_update(parent, st2, j_old * f2 * prod_others)

    # ----------------------------------------------------------- batch size

    def delta_size(self, root_tuple: Tuple_) -> int:
        """|ΔJ| for a tuple just inserted at this tree's root (O(1))."""
        root = self.nodes[self.tree.root]
        p = 1
        for c in root.children:
            p *= self.nodes[c].cntt.get(_proj(root_tuple, root.full_child_key_idx[c]), 0)
            if p == 0:
                return 0
        return p

    # ------------------------------------------------------------ retrieval

    def retrieve_delta(self, root_tuple: Tuple_, z: int) -> Tuple_ | None:
        """Join result at position ``z`` of ΔJ(root_tuple), or None (dummy).
        O(log N) — Algorithm 9/11, first call = Case 2 at the root."""
        root = self.nodes[self.tree.root]
        out = [None] * self._out_len
        for p, i in zip(root.out_idx, range(len(root_tuple))):
            out[p] = root_tuple[i]
        if not self._retrieve_children(root, root_tuple, root.full_child_key_idx, z, out):
            return None
        return tuple(out)

    def _retrieve_children(self, node: _Node, st: Tuple_, idx_map, z: int, out: list) -> bool:
        """Case 2: decompose z mixed-radix over children's c̃nt sizes."""
        for c in reversed(node.children):
            child = self.nodes[c]
            key_t = _proj(st, idx_map[c])
            s = child.cntt.get(key_t, 0)
            z, zc = divmod(z, s)
            if not self._retrieve(child, key_t, zc, out):
                return False
        return True

    def _retrieve(self, node: _Node, key_t: Tuple_, z: int, out: list) -> bool:
        """Case 3 (+ leaf): element at position z of the padded batch of
        ``key_t`` in ``T_node``; z ∈ [0, c̃nt). Returns False for dummies."""
        if z >= node.cnt.get(key_t, 0):
            return False  # the c̃nt − cnt padding at the end of the batch
        if node.is_leaf and not node.grouped:
            t = node.matches[key_t][z]
            for p, i in zip(node.out_idx, range(len(t))):
                out[p] = t[i]
            return True
        # Locate bucket i, in-bucket index j and inner offset l.
        bk = node.buckets[key_t]
        prefix = 0
        for i in sorted(bk):
            lst = bk[i][0]
            phi = len(lst) << i
            if z < prefix + phi:
                off = z - prefix
                j = off >> i
                l = off & ((1 << i) - 1)
                st = lst[j]
                break
            prefix += phi
        else:  # pragma: no cover - cnt == Σφ by construction
            raise AssertionError("position beyond bucket mass")
        if not node.grouped:
            for p, ii in zip(node.out_idx, range(len(st))):
                out[p] = st[ii]
            return self._retrieve_children(node, st, node.child_key_idx, l, out)
        # Grouping (Algorithm 11): split l into member index and child offset.
        h = self._child_prod(node, st, node.child_key_idx)
        m_idx, f = divmod(l, h) if h else (node.feq[st], 0)
        if m_idx >= node.feq[st]:
            return False  # f̃eq − feq padding
        member = node.members[st][m_idx]
        for p, ii in zip(node.out_idx, range(len(member))):
            out[p] = member[ii]
        return self._retrieve_children(node, member, node.full_child_key_idx, f, out)

    # ------------------------------------------- full-query sampling (op. 2)

    def full_size(self) -> int:
        """Upper bound Σ weights on |Q(R)| (cnt at the root, empty key)."""
        if not self.full_index:
            raise RuntimeError("TreeIndex built without full_index=True")
        return self.nodes[self.tree.root].cnt.get((), 0)

    def draw_full(self, rng: random.Random, max_tries: int = 10_000) -> Tuple_ | None:
        """Uniform sample from the current Q(R) in O(log N) expected time, by
        rejection over the root-level padded array J (Theorem 4.2 op. 2)."""
        size = self.full_size()
        if size == 0:
            return None
        root = self.nodes[self.tree.root]
        for _ in range(max_tries):
            out = [None] * self._out_len
            if self._retrieve(root, (), rng.randrange(size), out):
                return tuple(out)
        return None  # pragma: no cover - density makes this ~impossible


class DeltaBatch:
    """The (lazy) batch ΔJ ⊇ ΔQ(R, t) exposed through the Section 3.3/3.4
    primitives, backed by TreeIndex positional retrieval."""

    __slots__ = ("index", "root_tuple", "total", "consumed")

    def __init__(self, index: TreeIndex, root_tuple: Tuple_):
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


def is_real(x: Any) -> bool:
    """The predicate θ = isReal(·) of Algorithm 6."""
    return x is not None
