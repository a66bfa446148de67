"""Tests for the foreign-key combining optimization (Section 4.4) and the
streaming FK resolver."""
import pytest

from repro.datasets.ldbc import ldbc_lite
from repro.datasets.tpcds import tpcds_lite
from repro.joins import catalog
from repro.joins.fk import CombinedRelation, FKCombiner, Lookup
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin
from tests.util import duck, reorder


def test_combiner_base_after_dims():
    spec = CombinedRelation(
        occ="S",
        base_table="fact",
        base_cols=(("f_id", "F"), ("f_dim", "D")),
        lookups=(Lookup("D", "dim", "d_id", (("d_val", "V"),)),),
    )
    c = FKCombiner([spec])
    assert c.feed("dim", {"d_id": 1, "d_val": "x"}) == []
    assert c.feed("fact", {"f_id": 10, "f_dim": 1}) == [("S", (10, 1, "x"))]


def test_combiner_base_before_dims():
    spec = CombinedRelation(
        occ="S",
        base_table="fact",
        base_cols=(("f_id", "F"), ("f_dim", "D")),
        lookups=(Lookup("D", "dim", "d_id", (("d_val", "V"),)),),
    )
    c = FKCombiner([spec])
    assert c.feed("fact", {"f_id": 10, "f_dim": 1}) == []  # blocked
    assert c.feed("fact", {"f_id": 11, "f_dim": 2}) == []
    out = c.feed("dim", {"d_id": 1, "d_val": "x"})
    assert out == [("S", (10, 1, "x"))]  # only the matching base resumes
    assert c.feed("dim", {"d_id": 2, "d_val": "y"}) == [("S", (11, 2, "y"))]


def test_combiner_multi_hop_chain_resumes():
    spec = CombinedRelation(
        occ="S",
        base_table="fact",
        base_cols=(("f_id", "F"), ("f_a", "A")),
        lookups=(
            Lookup("A", "dim_a", "a_id", (("a_b", "B"),)),
            Lookup("B", "dim_b", "b_id", (("b_val", "V"),)),
        ),
    )
    c = FKCombiner([spec])
    assert c.feed("fact", {"f_id": 1, "f_a": 7}) == []  # blocked at hop 1
    assert c.feed("dim_a", {"a_id": 7, "a_b": 3}) == []  # re-blocked at hop 2
    assert c.feed("dim_b", {"b_id": 3, "b_val": 9}) == [("S", (1, 7, 3, 9))]


def test_combiner_duplicate_pk_ignored():
    spec = CombinedRelation(
        occ="S",
        base_table="fact",
        base_cols=(("f_id", "F"), ("f_dim", "D")),
        lookups=(Lookup("D", "dim", "d_id", (("d_val", "V"),)),),
    )
    c = FKCombiner([spec])
    c.feed("dim", {"d_id": 1, "d_val": "x"})
    assert c.feed("dim", {"d_id": 1, "d_val": "CHANGED"}) == []
    assert c.feed("fact", {"f_id": 5, "f_dim": 1}) == [("S", (5, 1, "x"))]


def test_combiner_one_table_two_roles():
    """The same table can be one spec's base and another's dimension."""
    s1 = CombinedRelation(
        occ="A",
        base_table="t",
        base_cols=(("x", "X"),),
    )
    s2 = CombinedRelation(
        occ="B",
        base_table="u",
        base_cols=(("y", "X"),),
        lookups=(Lookup("X", "t", "x", ()),),
    )
    c = FKCombiner([s1, s2])
    assert c.feed("u", {"y": 1}) == []
    assert c.feed("t", {"x": 1}) == [("B", (1,)), ("A", (1,))]


@pytest.mark.parametrize("make", [catalog.qx, catalog.qy, catalog.qz])
def test_opt_stream_matches_plain_results(make):
    """The combined query over the combined stream has exactly the original
    query's results (modulo attribute order)."""
    cq = make()
    tables = tpcds_lite(0.00005, seed=1, hd_rows=8)
    truth = duck(cq.sql(), **tables)
    oq = cq.opt_query()
    stream = cq.stream(tables, seed=1, opt=True)
    eng = RSJoin(oq, len(truth) + 10, seed=0).run(stream)
    got = reorder(set(eng.sample), oq.attrs, cq.query.attrs)
    assert got == truth


def test_q10_opt_matches_plain_results():
    cq = catalog.q10()
    tables = ldbc_lite(0.0005, seed=2)
    truth = duck(cq.sql(), **tables)
    assert len(truth) > 0
    oq = cq.opt_query()
    stream = cq.stream(tables, seed=2, opt=True)
    eng = RSJoin(oq, len(truth) + 10, seed=0).run(stream)
    got = reorder(set(eng.sample), oq.attrs, cq.query.attrs)
    assert got == truth


def test_q10_plain_matches_duckdb():
    cq = catalog.q10()
    tables = ldbc_lite(0.0005, seed=3)
    truth = duck(cq.sql(), **tables)
    stream = cq.stream(tables, seed=3)
    eng = RSJoin(cq.query, len(truth) + 10, seed=0).run(stream)
    assert set(eng.sample) == truth


def test_opt_sjoin_matches_too():
    cq = catalog.qy()
    tables = tpcds_lite(0.00005, seed=4, hd_rows=8)
    truth = duck(cq.sql(), **tables)
    oq = cq.opt_query()
    stream = cq.stream(tables, seed=4, opt=True)
    eng = SJoin(oq, len(truth) + 10, seed=0).run(stream)
    got = reorder(set(eng.sample), oq.attrs, cq.query.attrs)
    assert got == truth


def test_qx_opt_collapses_to_single_relation():
    cq = catalog.qx()
    oq = cq.opt_query()
    assert len(oq.relations) == 1
    tables = tpcds_lite(0.0001, seed=5, hd_rows=8)
    truth = duck(cq.sql(), **tables)
    stream = cq.stream(tables, seed=5, opt=True)
    eng = RSJoin(oq, len(truth) + 5, seed=0).run(stream)
    got = reorder(set(eng.sample), oq.attrs, cq.query.attrs)
    assert got == truth


def test_opt_reduces_relations():
    assert len(catalog.qz().opt_query().relations) == 3
    assert len(catalog.qy().opt_query().relations) == 2
    assert len(catalog.q10().opt_query().relations) == 4


def test_stream_opt_requires_fk_plan():
    cq = catalog.line_k(3)
    with pytest.raises(ValueError):
        cq.stream({"G": None}, opt=True)
    with pytest.raises(ValueError):
        cq.opt_query()
