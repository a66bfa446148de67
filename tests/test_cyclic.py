"""Tests for the cyclic (GHD) extension: triangle deltas and the dumbbell."""
import math

import pandas as pd
import pytest

from repro.joins.cyclic import (
    DUMBBELL_SQL,
    DumbbellRSJoin,
    _TriangleTracker,
    dumbbell_stream,
)
from tests.util import duck, tiny_graph

TRIANGLE_SQL = (
    "SELECT g1.src AS X1, g1.dst AS X2, g2.dst AS X3 "
    "FROM G AS g1, G AS g2, G AS g3 "
    "WHERE g1.dst = g2.src AND g2.dst = g3.src AND g3.dst = g1.src"
)


@pytest.mark.parametrize("seed", range(5))
def test_triangle_tracker_matches_sql(seed):
    pdf = tiny_graph(30, 7, seed=seed)
    edges = list(zip(pdf.src, pdf.dst))
    tr = _TriangleTracker()
    found = set()
    import random

    rng = random.Random(seed)
    items = [(i, e) for i in range(3) for e in edges]
    rng.shuffle(items)
    for i, e in items:
        for t in tr.insert(i, *e):
            assert t not in found  # each oriented triangle appears once
            found.add(t)
    assert found == duck(TRIANGLE_SQL, G=pdf)


def test_triangle_tracker_dedups_edges():
    tr = _TriangleTracker()
    assert tr.insert(0, 1, 2) == []
    assert tr.insert(0, 1, 2) == []
    assert len(tr.edges[0]) == 1


@pytest.mark.parametrize("seed", range(3))
def test_dumbbell_full_recovery(seed):
    pdf = tiny_graph(26, 6, seed=seed)
    truth = duck(DUMBBELL_SQL, G=pdf)
    assert truth, "pick graphs with at least one dumbbell"
    stream = dumbbell_stream(list(zip(pdf.src, pdf.dst)), seed=seed)
    eng = DumbbellRSJoin(len(truth) + 10, seed=seed).run(stream)
    assert set(eng.sample) == truth
    assert len(eng.sample) == len(truth)


def test_dumbbell_samples_valid():
    pdf = tiny_graph(28, 7, seed=9)
    truth = duck(DUMBBELL_SQL, G=pdf)
    assert len(truth) > 10
    stream = dumbbell_stream(list(zip(pdf.src, pdf.dst)), seed=1)
    eng = DumbbellRSJoin(8, seed=2).run(stream)
    assert len(eng.sample) == 8
    assert set(eng.sample) <= truth


def test_dumbbell_uniformity():
    pdf = tiny_graph(28, 6, seed=4)
    truth = sorted(duck(DUMBBELL_SQL, G=pdf))
    n = len(truth)
    assert n >= 8
    k, runs = 4, 600
    counts = {t: 0 for t in truth}
    for sd in range(runs):
        stream = dumbbell_stream(list(zip(pdf.src, pdf.dst)), seed=sd)
        eng = DumbbellRSJoin(k, seed=sd).run(stream)
        for t in eng.sample:
            counts[t] += 1
    p = min(1.0, k / n)
    mean, std = runs * p, math.sqrt(runs * p * (1 - p))
    for t, c in counts.items():
        assert abs(c - mean) <= 6 * std + 1, (t, c, mean)


def test_dumbbell_grouping_variant():
    pdf = tiny_graph(26, 6, seed=2)
    truth = duck(DUMBBELL_SQL, G=pdf)
    stream = dumbbell_stream(list(zip(pdf.src, pdf.dst)), seed=3)
    eng = DumbbellRSJoin(len(truth) + 5, seed=0, grouping=True).run(stream)
    assert set(eng.sample) == truth
