"""Tests for the join-query hypergraph model and GYO join trees."""
import pytest

from repro.joins import catalog
from repro.joins.query import JoinQuery, Relation


def test_relation_rejects_duplicate_attrs():
    with pytest.raises(ValueError):
        Relation("R", ("A", "A"))


def test_query_rejects_duplicate_names():
    with pytest.raises(ValueError):
        JoinQuery([Relation("R", ("A",)), Relation("R", ("B",))])


def test_query_needs_relations():
    with pytest.raises(ValueError):
        JoinQuery([])


def test_global_attr_order_first_appearance():
    q = JoinQuery.of(R1=("A", "B"), R2=("B", "C"), R3=("C", "A"))
    assert q.attrs == ("A", "B", "C")


@pytest.mark.parametrize("k", [2, 3, 4, 5])
def test_line_k_acyclic(k):
    assert catalog.line_k(k).query.is_acyclic()


@pytest.mark.parametrize("k", [2, 3, 4, 5, 6])
def test_star_k_acyclic(k):
    assert catalog.star_k(k).query.is_acyclic()


@pytest.mark.parametrize("make", [catalog.qx, catalog.qy, catalog.qz, catalog.q10])
def test_relational_queries_acyclic(make):
    cq = make()
    assert cq.query.is_acyclic(), cq.name


@pytest.mark.parametrize("make", [catalog.qy, catalog.qz, catalog.q10])
def test_opt_queries_acyclic(make):
    assert make().opt_query().is_acyclic()


def test_triangle_cyclic():
    q = JoinQuery.of(R1=("A", "B"), R2=("B", "C"), R3=("C", "A"))
    assert not q.is_acyclic()
    with pytest.raises(ValueError):
        q.join_tree_edges()


def test_4cycle_cyclic():
    q = JoinQuery.of(R1=("A", "B"), R2=("B", "C"), R3=("C", "D"), R4=("D", "A"))
    assert not q.is_acyclic()


def test_single_relation_acyclic():
    q = JoinQuery.of(R=("A", "B"))
    assert q.is_acyclic()
    t = q.rooted("R")
    assert t.root == "R" and t.children["R"] == []


def test_rooted_tree_structure_line3():
    q = catalog.line_k(3).query
    t = q.rooted("G1")
    assert t.parent["G1"] is None
    # line-3 tree is the path G1-G2-G3
    assert t.parent["G2"] == "G1" and t.parent["G3"] == "G2"
    assert t.key_attrs["G2"] == ("A1",) and t.key_attrs["G3"] == ("A2",)
    assert t.subtree_size("G1") == 3 and t.subtree_size("G3") == 1
    t2 = q.rooted("G2")
    assert sorted(t2.children["G2"]) == ["G1", "G3"]
    assert t2.key_attrs["G1"] == ("A1",)


def test_rooted_tree_every_root():
    q = catalog.qz().query
    for rel in q.relations:
        t = q.rooted(rel.name)
        assert set(t.order) == {r.name for r in q.relations}
        # parents precede children in order
        pos = {n: i for i, n in enumerate(t.order)}
        for n, p in t.parent.items():
            if p is not None:
                assert pos[p] < pos[n]


def test_rooted_unknown_root():
    with pytest.raises(KeyError):
        catalog.line_k(3).query.rooted("nope")


def test_key_attrs_star():
    # Any valid join tree works for star-k (all relations share H); every
    # non-root key must be exactly (H,).
    q = catalog.star_k(4).query
    t = q.rooted("G1")
    for c in ("G2", "G3", "G4"):
        assert t.parent[c] is not None
        assert t.key_attrs[c] == ("H",)
