"""Shared helpers for join tests: DuckDB ground truth and tiny graphs."""
from __future__ import annotations

import random

import duckdb
import pandas as pd


def duck(sql: str, **tables: pd.DataFrame) -> set[tuple]:
    """Run sql on DuckDB over registered pandas tables; rows as a set."""
    con = duckdb.connect()
    try:
        for name, t in tables.items():
            con.register(name, t)
        return set(map(tuple, con.execute(sql).fetchall()))
    finally:
        con.close()


def tiny_graph(n_edges: int, n_nodes: int, seed: int = 0) -> pd.DataFrame:
    """Small random digraph (unique edges, no self-loops)."""
    if n_edges > n_nodes * (n_nodes - 1):
        raise ValueError(f"{n_edges} edges impossible on {n_nodes} nodes")
    rng = random.Random(seed)
    seen = set()
    while len(seen) < n_edges:
        a, b = rng.randrange(n_nodes), rng.randrange(n_nodes)
        if a != b:
            seen.add((a, b))
    rows = sorted(seen)
    return pd.DataFrame({"src": [r[0] for r in rows], "dst": [r[1] for r in rows]})


def reorder(results: set[tuple], from_attrs, to_attrs) -> set[tuple]:
    """Reorder result tuples from one attribute order to another."""
    idx = [from_attrs.index(a) for a in to_attrs]
    return {tuple(t[i] for i in idx) for t in results}
