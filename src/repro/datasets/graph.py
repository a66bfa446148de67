"""Graph dataset: a seeded power-law digraph standing in for SNAP Epinions.

Epinions (508,837 edges over 75,879 nodes) has heavy-tailed in/out degree;
that skew is what (a) blows up line-k/star-k join sizes polynomially and
(b) makes SJoin's exact-count propagation quadratic-ish. We reproduce the
regime with Zipf-distributed endpoints at a reduced scale (Python engine —
see DESIGN.md substitutions).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

EPINIONS_EDGES = 508_837
EPINIONS_NODES = 75_879


def power_law_edges(
    n_edges: int,
    n_nodes: int,
    *,
    alpha: float = 1.2,
    seed: int = 0,
    correlated_hubs: bool = True,
) -> pd.DataFrame:
    """~n_edges unique directed edges (no self-loops) with Zipf(alpha)
    endpoints. With ``correlated_hubs`` (default, Epinions-like) the same
    vertices are in- and out-hubs, which is what makes path (line-k) join
    sizes explode; without it hubs are independent."""
    g = np.random.default_rng(seed)
    ranks = np.arange(1, n_nodes + 1)
    w = 1.0 / ranks.astype(np.float64) ** alpha
    w /= w.sum()
    perm_src = g.permutation(n_nodes) + 1
    perm_dst = perm_src if correlated_hubs else g.permutation(n_nodes) + 1
    seen: set[tuple[int, int]] = set()
    rows_s: list[int] = []
    rows_d: list[int] = []
    while len(rows_s) < n_edges:
        todo = max(1024, int((n_edges - len(rows_s)) * 1.5))
        src = perm_src[g.choice(n_nodes, size=todo, p=w)]
        dst = perm_dst[g.choice(n_nodes, size=todo, p=w)]
        for s, d in zip(src.tolist(), dst.tolist()):
            if s == d or (s, d) in seen:
                continue
            seen.add((s, d))
            rows_s.append(s)
            rows_d.append(d)
            if len(rows_s) == n_edges:
                break
    return pd.DataFrame({"src": rows_s, "dst": rows_d})


def epinions_lite(scale: float = 0.05, *, seed: int = 0, alpha: float = 1.2) -> pd.DataFrame:
    """Epinions scaled by ``scale`` (scale=1 ≈ the real edge/node counts)."""
    n_edges = max(10, int(EPINIONS_EDGES * scale))
    n_nodes = max(5, int(EPINIONS_NODES * scale))
    return power_law_edges(n_edges, n_nodes, alpha=alpha, seed=seed)
