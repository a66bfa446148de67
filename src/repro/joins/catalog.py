"""Catalog of the paper's evaluation queries (Section 6.1, Appendix A).

Graph queries (over an edge table ``G(src, dst)``): line-k, star-k, and the
cyclic dumbbell (handled by :mod:`repro.joins.cyclic`). Relational queries:
QX/QY/QZ over TPC-DS-lite and Q10 over LDBC-lite, each with a foreign-key
combined (``_opt``) form per Section 4.4.

The paper's QX SQL is truncated in the available text; following the QY/QZ
progression of [31], QX is taken to be the 3-relation FK chain
``store_sales ⋈ customer ⋈ household_demographics``.

Every entry knows how to turn base-table DataFrames into the tuple stream
(preloaded static tables first, then the shuffled streaming tuples — same
setup as Section 6.1), and how to render itself as SQL for the DuckDB and
Spark ground truth.
"""
from __future__ import annotations

import random
from dataclasses import dataclass, field
from typing import Mapping, Sequence

import pandas as pd

from repro.joins.fk import CombinedRelation, FKCombiner, Lookup, combined_query
from repro.joins.query import JoinQuery
from repro.joins.sql import query_sql

StreamItem = tuple[str, tuple]  # (occurrence name, tuple)


@dataclass
class CatalogQuery:
    """One benchmark query: hypergraph + data bindings + optional FK plan."""

    name: str
    query: JoinQuery
    # occurrence -> (base table, column per attribute)
    sources: dict[str, tuple[str, tuple[str, ...]]]
    preload_tables: tuple[str, ...] = ()
    fk_specs: tuple[CombinedRelation, ...] = ()
    # graph-style streams shuffle every (occurrence, tuple) item independently;
    # relational streams shuffle base rows and expand to occurrence items
    independent_shuffle: bool = False

    # ------------------------------------------------------------- plain

    def sql(self) -> str:
        return query_sql(self.query, self.sources)

    def _streaming_tables(self) -> list[str]:
        seen: dict[str, None] = {}
        for t, _ in self.sources.values():
            if t not in self.preload_tables:
                seen.setdefault(t)
        return list(seen)

    def _expand(self, table: str, row: Mapping) -> list[StreamItem]:
        out = []
        for occ, (t, cols) in self.sources.items():
            if t == table:
                out.append((occ, tuple(row[c] for c in cols)))
        return out

    def stream(
        self, tables: Mapping[str, pd.DataFrame], *, seed: int = 0, opt: bool = False
    ) -> list[StreamItem]:
        """The full tuple stream: preloaded tables (in order), then the
        shuffled streaming tuples. ``opt=True`` routes rows through the FK
        combiner and yields the combined query's stream."""
        if opt and not self.fk_specs:
            raise ValueError(f"{self.name} has no FK plan")
        rng = random.Random(seed)
        events: list[tuple[str, dict]] = []
        for t in self.preload_tables:
            events.extend((t, r) for r in tables[t].to_dict("records"))
        streaming: list[tuple[str, dict]] = []
        for t in self._streaming_tables():
            streaming.extend((t, r) for r in tables[t].to_dict("records"))
        rng.shuffle(streaming)
        events.extend(streaming)
        if opt:
            comb = FKCombiner(self.fk_specs)
            out: list[StreamItem] = []
            for t, row in events:
                out.extend(comb.feed(t, row))
            return out
        if self.independent_shuffle:
            # each occurrence copy gets its own shuffled pass (Section 6.1)
            items = [it for t, row in events for it in self._expand(t, row)]
            rng.shuffle(items)
            return items
        return [it for t, row in events for it in self._expand(t, row)]

    # --------------------------------------------------------------- opt

    def opt_query(self) -> JoinQuery:
        if not self.fk_specs:
            raise ValueError(f"{self.name} has no FK plan")
        return combined_query(self.fk_specs)


# ------------------------------------------------------------------ graph


def line_k(k: int) -> CatalogQuery:
    """line-k: paths of length k (Appendix A line-3/4/5)."""
    rels = {f"G{i}": (f"A{i - 1}", f"A{i}") for i in range(1, k + 1)}
    return CatalogQuery(
        name=f"line-{k}",
        query=JoinQuery.of(**rels),
        sources={f"G{i}": ("G", ("src", "dst")) for i in range(1, k + 1)},
        independent_shuffle=True,
    )


def star_k(k: int) -> CatalogQuery:
    """star-k: k edges sharing a source vertex (Appendix A star-4/5/6)."""
    rels = {f"G{i}": ("H", f"B{i}") for i in range(1, k + 1)}
    return CatalogQuery(
        name=f"star-{k}",
        query=JoinQuery.of(**rels),
        sources={f"G{i}": ("G", ("src", "dst")) for i in range(1, k + 1)},
        independent_shuffle=True,
    )


# ------------------------------------------------------------------ TPC-DS


def _qx_specs() -> tuple[CombinedRelation, ...]:
    return (
        CombinedRelation(
            occ="S",
            base_table="store_sales",
            base_cols=(("ss_id", "SSID"), ("ss_customer_sk", "CK")),
            lookups=(
                Lookup("CK", "customer", "c_customer_sk", (("c_current_hdemo_sk", "HD1"),)),
                Lookup("HD1", "household_demographics", "hd_demo_sk", (("hd_income_band_sk", "IB"),)),
            ),
        ),
    )


def qx() -> CatalogQuery:
    return CatalogQuery(
        name="QX",
        query=JoinQuery.of(SS=("SSID", "CK"), C1=("CK", "HD1"), D1=("HD1", "IB")),
        sources={
            "SS": ("store_sales", ("ss_id", "ss_customer_sk")),
            "C1": ("customer", ("c_customer_sk", "c_current_hdemo_sk")),
            "D1": ("household_demographics", ("hd_demo_sk", "hd_income_band_sk")),
        },
        preload_tables=("household_demographics",),
        fk_specs=_qx_specs(),
    )


def _t_spec() -> CombinedRelation:
    return CombinedRelation(
        occ="T",
        base_table="customer",
        base_cols=(("c_current_hdemo_sk", "HD2"), ("c_customer_sk", "C2ID")),
        lookups=(
            Lookup("HD2", "household_demographics", "hd_demo_sk", (("hd_income_band_sk", "IB"),)),
        ),
    )


def qy() -> CatalogQuery:
    return CatalogQuery(
        name="QY",
        query=JoinQuery.of(
            SS=("SSID", "CK"),
            C1=("CK", "HD1"),
            D1=("HD1", "IB"),
            D2=("IB", "HD2"),
            C2=("HD2", "C2ID"),
        ),
        sources={
            "SS": ("store_sales", ("ss_id", "ss_customer_sk")),
            "C1": ("customer", ("c_customer_sk", "c_current_hdemo_sk")),
            "D1": ("household_demographics", ("hd_demo_sk", "hd_income_band_sk")),
            "D2": ("household_demographics", ("hd_income_band_sk", "hd_demo_sk")),
            "C2": ("customer", ("c_current_hdemo_sk", "c_customer_sk")),
        },
        preload_tables=("household_demographics",),
        fk_specs=(_qx_specs()[0], _t_spec()),
    )


def qz() -> CatalogQuery:
    s = CombinedRelation(
        occ="S",
        base_table="store_sales",
        base_cols=(("ss_id", "SSID"), ("ss_customer_sk", "CK"), ("ss_item_sk", "IT")),
        lookups=(
            Lookup("CK", "customer", "c_customer_sk", (("c_current_hdemo_sk", "HD1"),)),
            Lookup("HD1", "household_demographics", "hd_demo_sk", (("hd_income_band_sk", "IB"),)),
            Lookup("IT", "item", "i_item_sk", (("i_category_id", "CAT"),)),
        ),
    )
    i2 = CombinedRelation(
        occ="I2",
        base_table="item",
        base_cols=(("i_category_id", "CAT"), ("i_item_sk", "IID2")),
    )
    return CatalogQuery(
        name="QZ",
        query=JoinQuery.of(
            SS=("SSID", "CK", "IT"),
            C1=("CK", "HD1"),
            D1=("HD1", "IB"),
            D2=("IB", "HD2"),
            C2=("HD2", "C2ID"),
            I1=("IT", "CAT"),
            I2=("CAT", "IID2"),
        ),
        sources={
            "SS": ("store_sales", ("ss_id", "ss_customer_sk", "ss_item_sk")),
            "C1": ("customer", ("c_customer_sk", "c_current_hdemo_sk")),
            "D1": ("household_demographics", ("hd_demo_sk", "hd_income_band_sk")),
            "D2": ("household_demographics", ("hd_income_band_sk", "hd_demo_sk")),
            "C2": ("customer", ("c_current_hdemo_sk", "c_customer_sk")),
            "I1": ("item", ("i_item_sk", "i_category_id")),
            "I2": ("item", ("i_category_id", "i_item_sk")),
        },
        preload_tables=("household_demographics",),
        fk_specs=(s, _t_spec(), i2),
    )


# ------------------------------------------------------------------- LDBC


def q10() -> CatalogQuery:
    m = CombinedRelation(
        occ="M",
        base_table="message",
        base_cols=(("id", "MID"), ("creator_person_id", "P1")),
        lookups=(
            Lookup("P1", "person", "id", (("location_city_id", "CI"),)),
            Lookup("CI", "city", "id", (("part_of_place_id", "CO"),)),
            Lookup("CO", "country", "id", ()),
        ),
    )
    h1 = CombinedRelation(
        occ="H1",
        base_table="has_tag",
        base_cols=(("message_id", "MID"), ("tag_id", "T1")),
        lookups=(Lookup("T1", "tag", "id", (("type_tag_class_id", "TAG1C"),)),),
    )
    h2 = CombinedRelation(
        occ="H2",
        base_table="has_tag",
        base_cols=(("message_id", "MID"), ("tag_id", "T2")),
        lookups=(
            Lookup("T2", "tag", "id", (("type_tag_class_id", "TC"),)),
            Lookup("TC", "tag_class", "id", ()),
        ),
    )
    kn = CombinedRelation(
        occ="K",
        base_table="knows",
        base_cols=(("person1_id", "P1"), ("person2_id", "P2")),
        lookups=(Lookup("P2", "person", "id", (("location_city_id", "P2CITY"),)),),
    )
    return CatalogQuery(
        name="Q10",
        query=JoinQuery.of(
            MSG=("MID", "P1"),
            HT1=("MID", "T1"),
            TAG1=("T1", "TAG1C"),
            HT2=("MID", "T2"),
            TAG2=("T2", "TC"),
            TGC=("TC",),
            PERS1=("P1", "CI"),
            CITY=("CI", "CO"),
            CTRY=("CO",),
            KN=("P1", "P2"),
            PERS2=("P2", "P2CITY"),
        ),
        sources={
            "MSG": ("message", ("id", "creator_person_id")),
            "HT1": ("has_tag", ("message_id", "tag_id")),
            "TAG1": ("tag", ("id", "type_tag_class_id")),
            "HT2": ("has_tag", ("message_id", "tag_id")),
            "TAG2": ("tag", ("id", "type_tag_class_id")),
            "TGC": ("tag_class", ("id",)),
            "PERS1": ("person", ("id", "location_city_id")),
            "CITY": ("city", ("id", "part_of_place_id")),
            "CTRY": ("country", ("id",)),
            "KN": ("knows", ("person1_id", "person2_id")),
            "PERS2": ("person", ("id", "location_city_id")),
        },
        preload_tables=("tag", "tag_class", "city", "country"),
        fk_specs=(m, h1, h2, kn),
    )
