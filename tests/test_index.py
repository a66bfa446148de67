"""Deep correctness tests for the dynamic acyclic index (Section 4.3/4.4):
structural invariants, Lemma 4.4 bounds, delta-batch enumeration vs brute
force, density guarantees, and full-query sampling."""
import math
import random

import pytest

from repro.joins import catalog
from repro.joins.index import TreeIndex, next_pow2
from repro.joins.query import JoinQuery
from repro.joins.reference import brute_force_delta, brute_force_join


def _proj(t, idx):
    return tuple(t[i] for i in idx)


def check_invariants(idx: TreeIndex, tables):
    """Recompute cnt/c̃nt/feq/buckets from scratch and compare."""
    q, tree = idx.query, idx.tree
    for name in tree.order:
        node = idx.nodes[name]
        if node.is_root and not idx.full_index:
            continue
        rows = list(tables.get(name, []))
        if node.grouped:
            groups: dict = {}
            for t in rows:
                groups.setdefault(_proj(t, node.group_idx), []).append(t)
            assert node.feq == {g: len(ms) for g, ms in groups.items()}
            for g, f in node.feq.items():
                assert node.feqt[g] == next_pow2(f)
                assert sorted(node.members[g]) == sorted(groups[g])
            stored = list(groups)
        else:
            stored = rows

        def weight(st):
            w = node.feqt[st] if node.grouped else 1
            for c in node.children:
                w *= idx.nodes[c].cntt.get(_proj(st, node.child_key_idx[c]), 0)
            return w

        per_key: dict = {}
        for st in stored:
            per_key.setdefault(_proj(st, node.key_idx), []).append(st)
        for key_t, sts in per_key.items():
            cnt = sum(weight(st) for st in sts)
            assert node.cnt.get(key_t, 0) == cnt, (name, key_t)
            assert node.cntt.get(key_t, 0) == next_pow2(cnt)
            got = {}
            for i, (lst, pos) in node.buckets.get(key_t, {}).items():
                assert len(lst) > 0  # empty buckets are deleted
                for j, st in enumerate(lst):
                    got[st] = i
                    assert pos[st] == j
            want = {st: weight(st).bit_length() - 1 for st in sts if weight(st) > 0}
            assert got == want, (name, key_t)
        # matches lists hold exactly the stored tuples grouped by key
        flat = [st for lst in node.matches.values() for st in lst]
        assert sorted(flat) == sorted(set(stored))


def check_lemma44(idx: TreeIndex, tables):
    """c̃nt[T,e,t] ≤ 2^{|T_e|} · |(⋈_{e'∈T_e} R_e') ⋉ t| and cnt ≥ exact."""
    q, tree = idx.query, idx.tree
    for name in tree.order:
        node = idx.nodes[name]
        if node.is_root and not idx.full_index:
            continue
        sub_rels = [n for n in tree.order if _in_subtree(tree, name, n)]
        subq = JoinQuery(q.by_name[n] for n in sub_rels)
        results = brute_force_join(subq, {n: tables.get(n, []) for n in sub_rels})
        key_attrs = tree.key_attrs[name]
        kidx = tuple(subq.attrs.index(a) for a in key_attrs)
        exact: dict = {}
        for r in results:
            k = _proj(r, kidx)
            exact[k] = exact.get(k, 0) + 1
        for key_t, c in idx.nodes[name].cnt.items():
            e = exact.get(key_t, 0)
            assert c >= e, (name, key_t)
            assert idx.nodes[name].cntt[key_t] <= (2 ** node.subtree_size) * max(e, 1) or e == 0


def _in_subtree(tree, anc, n):
    while n is not None:
        if n == anc:
            return True
        n = tree.parent[n]
    return False


def _stream_and_check(cq, tables_rows, stream, *, grouping, full_index=False, deep=True):
    """Drive all rooted trees over the stream; after each insert, enumerate
    the delta batch and compare against brute force."""
    q = cq.query
    idxs = {
        r.name: TreeIndex(q.rooted(r.name), grouping=grouping,
                          full_index=(full_index and r.name == q.relations[0].name))
        for r in q.relations
    }
    current: dict = {r.name: [] for r in q.relations}
    seen = {r.name: set() for r in q.relations}
    all_reals: list = []
    phi_bound = 0.5 ** (2 * len(q.relations))
    for occ, t in stream:
        if t in seen[occ]:
            continue
        seen[occ].add(t)
        current[occ].append(t)
        for ix in idxs.values():
            ix.insert(occ, t)
        ix = idxs[occ]
        size = ix.delta_size(t)
        items = [ix.retrieve_delta(t, z) for z in range(size)]
        reals = [x for x in items if x is not None]
        expect = brute_force_delta(q, current, occ, t)
        assert set(reals) == expect, (occ, t)
        assert len(reals) == len(set(reals))  # no duplicates inside a batch
        if size:
            assert len(reals) / size >= phi_bound or len(reals) == 0
        all_reals.extend(reals)
    full = brute_force_join(q, current)
    assert set(all_reals) == full
    assert len(all_reals) == len(full)  # each result in exactly one batch
    if deep:
        for ix in idxs.values():
            check_invariants(ix, current)
            check_lemma44(ix, current)
    return idxs, current


def _graph_stream(cq, n_edges, seed):
    from tests.util import tiny_graph

    pdf = tiny_graph(n_edges, max(4, int(n_edges**0.5) + 3), seed)
    return cq.stream({"G": pdf}, seed=seed)


@pytest.mark.parametrize("grouping", [False, True])
@pytest.mark.parametrize("k,n_edges,seed", [(2, 20, 0), (3, 18, 1), (3, 25, 2), (4, 14, 3)])
def test_line_delta_enumeration(k, n_edges, seed, grouping):
    cq = catalog.line_k(k)
    _stream_and_check(cq, None, _graph_stream(cq, n_edges, seed), grouping=grouping)


@pytest.mark.parametrize("grouping", [False, True])
@pytest.mark.parametrize("k,n_edges,seed", [(3, 16, 0), (4, 12, 1)])
def test_star_delta_enumeration(k, n_edges, seed, grouping):
    cq = catalog.star_k(k)
    _stream_and_check(cq, None, _graph_stream(cq, n_edges, seed), grouping=grouping)


@pytest.mark.parametrize("grouping", [False, True])
def test_qz_delta_enumeration(grouping):
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qz()
    tables = tpcds_lite(0.00002, seed=4, hd_rows=6)
    stream = cq.stream(tables, seed=4)
    _stream_and_check(cq, None, stream, grouping=grouping)


@pytest.mark.parametrize("grouping", [False, True])
def test_full_index_invariants(grouping):
    cq = catalog.line_k(3)
    _stream_and_check(
        cq, None, _graph_stream(cq, 20, 5), grouping=grouping, full_index=True
    )


def test_full_index_size_bounds():
    cq = catalog.line_k(3)
    idxs, current = _stream_and_check(
        cq, None, _graph_stream(cq, 24, 6), grouping=False, full_index=True, deep=False
    )
    ix = idxs[cq.query.relations[0].name]
    full = brute_force_join(cq.query, current)
    n_rel = len(cq.query.relations)
    assert ix.full_size() >= len(full)
    if full:
        assert ix.full_size() <= len(full) / (0.5 ** (2 * n_rel))


def test_draw_full_uniform():
    cq = catalog.line_k(3)
    idxs, current = _stream_and_check(
        cq, None, _graph_stream(cq, 20, 7), grouping=False, full_index=True, deep=False
    )
    ix = idxs[cq.query.relations[0].name]
    full = sorted(brute_force_join(cq.query, current))
    assert len(full) >= 5
    rng = random.Random(0)
    draws = 4000
    counts = {t: 0 for t in full}
    for _ in range(draws):
        s = ix.draw_full(rng)
        counts[s] += 1
    mean = draws / len(full)
    std = math.sqrt(draws * (1 / len(full)) * (1 - 1 / len(full)))
    for t, c in counts.items():
        assert abs(c - mean) <= 6 * std + 1, (t, c, mean)


def test_draw_full_empty():
    q = catalog.line_k(3).query
    ix = TreeIndex(q.rooted("G1"), full_index=True)
    assert ix.full_size() == 0
    assert ix.draw_full(random.Random(0)) is None


def test_full_size_requires_flag():
    q = catalog.line_k(3).query
    ix = TreeIndex(q.rooted("G1"))
    with pytest.raises(RuntimeError):
        ix.full_size()


def test_next_pow2():
    assert [next_pow2(x) for x in [0, 1, 2, 3, 4, 5, 8, 9]] == [0, 1, 2, 4, 4, 8, 8, 16]


def test_delta_size_zero_for_unmatched():
    q = catalog.line_k(2).query
    ix = TreeIndex(q.rooted("G1"))
    ix.insert("G2", (5, 6))
    assert ix.delta_size((1, 2)) == 0  # A1=2 has no G2 match
    assert ix.delta_size((1, 5)) == 1
    assert ix.retrieve_delta((1, 5), 0) == (1, 5, 6)
