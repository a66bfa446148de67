"""Tests for the query catalog: SQL generation, stream construction."""
import pytest

from repro.joins import catalog
from repro.joins.reference import brute_force_join
from repro.joins.sql import query_sql
from tests.util import duck, tiny_graph


def test_sql_matches_brute_force_line3():
    cq = catalog.line_k(3)
    pdf = tiny_graph(20, 6, seed=0)
    rows = list(zip(pdf.src, pdf.dst))
    truth = brute_force_join(cq.query, {f"G{i}": rows for i in (1, 2, 3)})
    assert duck(cq.sql(), G=pdf) == truth


def test_sql_matches_brute_force_star3():
    cq = catalog.star_k(3)
    pdf = tiny_graph(15, 5, seed=1)
    rows = list(zip(pdf.src, pdf.dst))
    truth = brute_force_join(cq.query, {f"G{i}": rows for i in (1, 2, 3)})
    assert duck(cq.sql(), G=pdf) == truth


def test_sql_output_order_is_query_attrs():
    cq = catalog.line_k(3)
    sql = cq.sql()
    # SELECT aliases appear in query.attrs order (A0, A1, A2, A3)
    pos = [sql.index(f"AS {a}") for a in cq.query.attrs]
    assert pos == sorted(pos)


def test_sql_validates_source_arity():
    cq = catalog.line_k(2)
    with pytest.raises(ValueError):
        query_sql(cq.query, {"G1": ("G", ("src",)), "G2": ("G", ("src", "dst"))})


def test_graph_stream_contents():
    cq = catalog.line_k(3)
    pdf = tiny_graph(10, 5, seed=2)
    stream = cq.stream({"G": pdf}, seed=0)
    assert len(stream) == 30  # every copy receives every edge
    per_occ = {}
    for occ, t in stream:
        per_occ.setdefault(occ, set()).add(t)
    edges = set(zip(pdf.src, pdf.dst))
    assert per_occ == {f"G{i}": edges for i in (1, 2, 3)}


def test_graph_stream_shuffle_differs_by_seed():
    cq = catalog.line_k(3)
    pdf = tiny_graph(10, 5, seed=2)
    assert cq.stream({"G": pdf}, seed=0) != cq.stream({"G": pdf}, seed=1)
    assert cq.stream({"G": pdf}, seed=0) == cq.stream({"G": pdf}, seed=0)


def test_relational_stream_preloads_dimensions_first():
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qz()
    tables = tpcds_lite(0.00005, seed=0, hd_rows=6)
    stream = cq.stream(tables, seed=0)
    n_hd = len(tables["household_demographics"])
    # household_demographics feeds occurrences D1 and D2 → first 2*n_hd items
    head = stream[: 2 * n_hd]
    assert {occ for occ, _ in head} == {"D1", "D2"}
    assert all(occ not in ("D1", "D2") for occ, _ in stream[2 * n_hd:])


def test_relational_stream_expands_shared_tables():
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qy()
    tables = tpcds_lite(0.00005, seed=0, hd_rows=6)
    stream = cq.stream(tables, seed=0)
    occs = {occ for occ, _ in stream}
    assert occs == {"SS", "C1", "C2", "D1", "D2"}
    n_c = len(tables["customer"])
    assert sum(1 for occ, _ in stream if occ == "C1") == n_c
    assert sum(1 for occ, _ in stream if occ == "C2") == n_c


def test_opt_stream_emits_only_combined_occurrences():
    from repro.datasets.tpcds import tpcds_lite

    cq = catalog.qz()
    tables = tpcds_lite(0.00005, seed=0, hd_rows=6)
    stream = cq.stream(tables, seed=0, opt=True)
    occs = {occ for occ, _ in stream}
    assert occs <= {"S", "T", "I2"}


@pytest.mark.parametrize("make,nrel", [
    (lambda: catalog.line_k(3), 3),
    (lambda: catalog.line_k(5), 5),
    (lambda: catalog.star_k(6), 6),
    (catalog.qx, 3),
    (catalog.qy, 5),
    (catalog.qz, 7),
    (catalog.q10, 11),
])
def test_catalog_arity(make, nrel):
    assert len(make().query.relations) == nrel
