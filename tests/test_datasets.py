"""Tests for the synthetic dataset generators (DESIGN.md substitutions)."""
import numpy as np
import pytest

from repro.datasets.graph import epinions_lite, power_law_edges
from repro.datasets.ldbc import ldbc_lite
from repro.datasets.tpcds import tpcds_lite


def test_power_law_shape():
    pdf = power_law_edges(500, 100, seed=0)
    assert len(pdf) == 500
    assert list(pdf.columns) == ["src", "dst"]
    assert not (pdf.src == pdf.dst).any()
    assert not pdf.duplicated().any()
    assert pdf.src.between(1, 100).all() and pdf.dst.between(1, 100).all()


def test_power_law_is_skewed():
    pdf = power_law_edges(2000, 500, seed=1, alpha=1.2)
    deg = pdf.src.value_counts()
    # heavy tail: top hub carries far more than the mean degree
    assert deg.iloc[0] > 8 * deg.mean()


def test_power_law_deterministic():
    a = power_law_edges(300, 80, seed=7)
    b = power_law_edges(300, 80, seed=7)
    assert a.equals(b)
    c = power_law_edges(300, 80, seed=8)
    assert not a.equals(c)


def test_epinions_lite_scaling():
    small = epinions_lite(0.001, seed=0)
    assert len(small) == int(508_837 * 0.001)


def test_tpcds_integrity():
    t = tpcds_lite(0.001, seed=0)
    ss, c, hd, it = t["store_sales"], t["customer"], t["household_demographics"], t["item"]
    assert ss.ss_customer_sk.isin(c.c_customer_sk).all()
    assert ss.ss_item_sk.isin(it.i_item_sk).all()
    assert c.c_current_hdemo_sk.isin(hd.hd_demo_sk).all()
    assert hd.hd_income_band_sk.between(1, 20).all()
    assert it.i_category_id.between(1, 10).all()
    assert c.c_customer_sk.is_unique and hd.hd_demo_sk.is_unique and it.i_item_sk.is_unique


def test_tpcds_scaling():
    small = tpcds_lite(0.001, seed=0)
    big = tpcds_lite(0.002, seed=0)
    assert len(big["store_sales"]) == 2 * len(small["store_sales"])


def test_ldbc_integrity():
    t = ldbc_lite(0.001, seed=0)
    assert t["message"].creator_person_id.isin(t["person"].id).all()
    assert t["person"].location_city_id.isin(t["city"].id).all()
    assert t["city"].part_of_place_id.isin(t["country"].id).all()
    assert t["tag"].type_tag_class_id.isin(t["tag_class"].id).all()
    assert t["has_tag"].message_id.isin(t["message"].id).all()
    assert t["has_tag"].tag_id.isin(t["tag"].id).all()
    assert t["knows"].person1_id.isin(t["person"].id).all()
    assert t["knows"].person2_id.isin(t["person"].id).all()
    assert not (t["knows"].person1_id == t["knows"].person2_id).any()
    assert not t["has_tag"].duplicated().any()


def test_ldbc_deterministic():
    a = ldbc_lite(0.001, seed=3)["has_tag"]
    b = ldbc_lite(0.001, seed=3)["has_tag"]
    assert a.equals(b)
