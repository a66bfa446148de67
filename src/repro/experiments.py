"""Experiment harnesses — one function per evaluation exhibit of Section 6.

Each ``figN_rows``/``tableN_rows`` function returns a list of row dicts (the
numbers behind the paper's figure/table); `jobs/` print them at full scale
and `benchmarks/` time them at reduced scale. Paper-vs-ours comparisons live
in EXPERIMENTS.md.

All scales are reduced relative to the paper (Python engine vs the authors'
C++; see DESIGN.md). A ``budget_s`` wall-clock cutoff stands in for the
paper's 12-hour timeout: entries report ``finished=False`` (plotted by the
paper as missing bars) when exceeded.
"""
from __future__ import annotations

import time
import tracemalloc
from typing import Callable, Sequence

import duckdb
import numpy as np
import pandas as pd

from repro.core.reservoir import ListBatch, Reservoir, classic_reservoir
from repro.core.streams import make_string_stream
from repro.datasets.graph import power_law_edges
from repro.datasets.ldbc import ldbc_lite
from repro.datasets.tpcds import tpcds_lite
from repro.joins import catalog
from repro.joins.cyclic import DumbbellRSJoin, dumbbell_stream
from repro.joins.query import JoinQuery
from repro.joins.rsjoin import RSJoin
from repro.joins.sjoin import SJoin
from repro.joins.sql import query_sql

# ------------------------------------------------------------------ helpers

DEFAULT_GRAPH = dict(n_edges=10_000, n_nodes=4_000, alpha=1.3, seed=0)


def graph_for(scale: float = 1.0, **overrides) -> pd.DataFrame:
    cfg = dict(DEFAULT_GRAPH)
    cfg["n_edges"] = int(cfg["n_edges"] * scale)
    cfg["n_nodes"] = max(10, int(cfg["n_nodes"] * scale))
    cfg.update(overrides)
    return power_law_edges(**cfg)


def run_stream_timed(
    engine, stream: Sequence, *, budget_s: float | None = None, check_every: int = 256
) -> tuple[float, bool]:
    """Feed the stream; returns (elapsed seconds, finished?). The budget is
    the stand-in for the paper's 12-hour timeout."""
    t0 = time.perf_counter()
    for i, (occ, t) in enumerate(stream):
        engine.insert(occ, t)
        if budget_s is not None and (i % check_every) == 0 and time.perf_counter() - t0 > budget_s:
            return time.perf_counter() - t0, False
    return time.perf_counter() - t0, True


def _engine_factory(cq, method: str, k: int, seed: int = 0):
    """method ∈ {RSJoin, RSJoin_opt, SJoin, SJoin_opt} as in Figure 5."""
    opt = method.endswith("_opt")
    q = cq.opt_query() if opt else cq.query
    if method.startswith("RSJoin"):
        # _opt additionally enables grouping (Section 4.4 — both optimizations)
        return RSJoin(q, k, seed=seed, grouping=opt)
    return SJoin(q, k, seed=seed)


def exact_count(query: JoinQuery, arrived: dict[str, list[tuple]]) -> int:
    """|Q(R)| of the arrived prefix via DuckDB (count only, not materialized)."""
    con = duckdb.connect()
    try:
        sources = {}
        for rel in query.relations:
            rows = arrived.get(rel.name, [])
            pdf = pd.DataFrame(rows or None, columns=list(rel.attrs))
            if not len(pdf):
                pdf = pd.DataFrame({a: pd.Series(dtype="int64") for a in rel.attrs})
            con.register(f"t_{rel.name}", pdf)
            sources[rel.name] = (f"t_{rel.name}", rel.attrs)
        inner = query_sql(query, sources)
        return con.execute(f"SELECT COUNT(*) FROM ({inner})").fetchone()[0]
    finally:
        con.close()


# ------------------------------------------------- Fig 5: total running time

GRAPH_QUERIES = ["line-3", "line-4", "line-5", "star-4", "star-5", "star-6", "dumbbell"]
REL_QUERIES = ["QX", "QY", "QZ", "Q10"]


def _catalog_query(name: str):
    if name.startswith("line-"):
        return catalog.line_k(int(name.split("-")[1]))
    if name.startswith("star-"):
        return catalog.star_k(int(name.split("-")[1]))
    return {"QX": catalog.qx, "QY": catalog.qy, "QZ": catalog.qz, "Q10": catalog.q10}[name]()


def _tables_for(name: str, *, graph_scale: float, tpcds_sf: float, ldbc_sf: float, seed: int = 0):
    if name == "Q10":
        return ldbc_lite(ldbc_sf, seed=seed)
    if name in ("QX", "QY", "QZ"):
        return tpcds_lite(tpcds_sf, seed=seed)
    return {"G": graph_for(graph_scale)}


def fig5_rows(
    *,
    graph_scale: float = 1.0,
    tpcds_sf: float = 0.002,
    ldbc_sf: float = 0.002,
    k_graph: int = 1_000,
    k_rel: int = 10_000,
    budget_s: float = 60.0,
    queries: Sequence[str] | None = None,
    seed: int = 0,
) -> list[dict]:
    """Figure 5: total running time per query × method. Sample sizes follow
    the paper's ratio (graph k=100k, relational k=1M — scaled down with N)."""
    rows = []
    for name in queries or (GRAPH_QUERIES + REL_QUERIES):
        is_graph = name not in REL_QUERIES
        k = k_graph if is_graph else k_rel
        tables = _tables_for(
            name, graph_scale=graph_scale, tpcds_sf=tpcds_sf, ldbc_sf=ldbc_sf, seed=seed
        )
        if name == "dumbbell":
            # SJoin does not support cyclic queries (as in the paper)
            stream = dumbbell_stream(list(zip(tables["G"].src, tables["G"].dst)), seed=seed)
            eng = DumbbellRSJoin(k, seed=seed)
            dt, ok = run_stream_timed(eng, stream, budget_s=budget_s)
            rows.append(dict(query=name, method="RSJoin", seconds=dt, finished=ok,
                             n_stream=len(stream), total_delta=eng.engine.total_delta))
            rows.append(dict(query=name, method="SJoin", seconds=None, finished=False,
                             n_stream=len(stream), total_delta=None))
            continue
        cq = _catalog_query(name)
        methods = ["RSJoin", "SJoin"]
        if cq.fk_specs:
            methods += ["RSJoin_opt", "SJoin_opt"]
        for method in methods:
            stream = cq.stream(tables, seed=seed, opt=method.endswith("_opt"))
            eng = _engine_factory(cq, method, k, seed=seed)
            dt, ok = run_stream_timed(eng, stream, budget_s=budget_s)
            rows.append(dict(query=name, method=method, seconds=dt, finished=ok,
                             n_stream=len(stream), total_delta=eng.total_delta))
    return rows


# --------------------------------------- Fig 6: update time distribution


def fig6_rows(*, graph_scale: float = 1.0, seed: int = 0, budget_s: float = 120.0) -> list[dict]:
    """Figure 6: per-tuple update time (sampling disabled), line-4."""
    cq = catalog.line_k(4)
    tables = {"G": graph_for(graph_scale)}
    stream = cq.stream(tables, seed=seed)
    rows = []
    for method, make in (
        ("RSJoin", lambda: RSJoin(cq.query, 1, sampling=False)),
        ("SJoin", lambda: SJoin(cq.query, 1, sampling=False)),
    ):
        eng = make()
        times = np.empty(len(stream))
        t_start = time.perf_counter()
        n = 0
        for occ, t in stream:
            t0 = time.perf_counter_ns()
            eng.insert(occ, t)
            times[n] = time.perf_counter_ns() - t0
            n += 1
            if time.perf_counter() - t_start > budget_s:
                break
        us = times[:n] / 1e3
        rows.append(dict(
            method=method, n=n, finished=(n == len(stream)),
            mean_us=float(us.mean()), p50_us=float(np.percentile(us, 50)),
            p99_us=float(np.percentile(us, 99)), max_us=float(us.max()),
        ))
    return rows


# --------------------------- Fig 7: running time vs input size / join size


def fig7_rows(*, graph_scale: float = 1.0, k: int = 10_000, seed: int = 0,
              budget_s: float = 120.0, with_join_size: bool = True) -> list[dict]:
    """Figure 7: cumulative time + exact join size after every 10% of the
    line-3 stream."""
    cq = catalog.line_k(3)
    stream = cq.stream({"G": graph_for(graph_scale)}, seed=seed)
    deciles = [int(len(stream) * f / 10) for f in range(1, 11)]
    rows = []
    for method, make in (
        ("RSJoin", lambda: RSJoin(cq.query, k, seed=seed)),
        ("SJoin", lambda: SJoin(cq.query, k, seed=seed)),
    ):
        eng = make()
        arrived: dict[str, list] = {r.name: [] for r in cq.query.relations}
        elapsed = 0.0
        start = 0
        aborted = False
        for di, end in enumerate(deciles, start=1):
            t0 = time.perf_counter()
            for occ, t in stream[start:end]:
                eng.insert(occ, t)
            elapsed += time.perf_counter() - t0
            for occ, t in stream[start:end]:
                arrived[occ].append(t)
            start = end
            jsize = exact_count(cq.query, arrived) if with_join_size else None
            rows.append(dict(method=method, pct=di * 10, seconds=elapsed,
                             join_size=jsize, n_stream=end, finished=True))
            if elapsed > budget_s:
                aborted = True
                break
        if aborted:
            rows[-1]["finished"] = False
    return rows


# --------------------------------------- Fig 8: running time vs sample size


def fig8_rows(*, graph_scale: float = 1.0, ks: Sequence[int] | None = None,
              seed: int = 0, budget_s: float = 120.0) -> list[dict]:
    """Figure 8: total line-3 time as k sweeps from k ≪ N to k > N."""
    cq = catalog.line_k(3)
    stream = cq.stream({"G": graph_for(graph_scale)}, seed=seed)
    n = len(stream)
    ks = list(ks) if ks else [n // 100, n // 10, n // 2, n, 2 * n, 5 * n, 10 * n]
    rows = []
    for method, make in (
        ("RSJoin", lambda k: RSJoin(cq.query, k, seed=seed)),
        ("SJoin", lambda k: SJoin(cq.query, k, seed=seed)),
    ):
        for k in ks:
            eng = make(k)
            dt, ok = run_stream_timed(eng, stream, budget_s=budget_s)
            rows.append(dict(method=method, k=k, n_stream=n, seconds=dt, finished=ok))
    return rows


# -------------------------- Fig 9 (the table): optimizations on QZ


def table9_rows(*, tpcds_sf: float = 0.002, k: int = 10_000, seed: int = 0,
                budget_s: float = 300.0) -> list[dict]:
    """Figure 9's table: #propagation-loop executions + run time for
    {no optimization, foreign-key, foreign-key + grouping} on QZ."""
    cq = catalog.qz()
    tables = tpcds_lite(tpcds_sf, seed=seed)
    variants = [
        ("N/A", False, False),
        ("Foreign-key", True, False),
        ("Foreign-key + Grouping", True, True),
    ]
    rows = []
    for label, opt, grouping in variants:
        q = cq.opt_query() if opt else cq.query
        stream = cq.stream(tables, seed=seed, opt=opt)
        eng = RSJoin(q, k, seed=seed, grouping=grouping)
        dt, ok = run_stream_timed(eng, stream, budget_s=budget_s)
        rows.append(dict(optimizations=label, executions=eng.prop_count,
                         seconds=dt, finished=ok))
    return rows


# ------------------------------------------ Fig 10: scalability (QZ vs SF)


def fig10_rows(*, sfs: Sequence[float] = (0.0005, 0.0015, 0.005, 0.015),
               k: int = 10_000, seed: int = 0, budget_s: float = 300.0) -> list[dict]:
    """Figure 10: QZ total time at growing scale factors, RSJoin and
    RSJoin_opt (SJoin omitted — it exceeds any reasonable budget, as in the
    paper where it missed 4 hours at SF1)."""
    cq = catalog.qz()
    rows = []
    for sf in sfs:
        tables = tpcds_lite(sf, seed=seed)
        n_input = sum(len(t) for t in tables.values())
        for method in ("RSJoin", "RSJoin_opt"):
            stream = cq.stream(tables, seed=seed, opt=method.endswith("_opt"))
            eng = _engine_factory(cq, method, k, seed=seed)
            dt, ok = run_stream_timed(eng, stream, budget_s=budget_s)
            rows.append(dict(method=method, sf=sf, input_rows=n_input,
                             seconds=dt, finished=ok))
    return rows


# ------------------------------------------------ Fig 11: memory vs input


def _memory_deciles(make_engine, stream) -> list[tuple[int, int]]:
    tracemalloc.start()
    try:
        eng = make_engine()
        base = tracemalloc.get_traced_memory()[0]
        out = []
        deciles = [int(len(stream) * f / 10) for f in range(1, 11)]
        start = 0
        for di, end in enumerate(deciles, start=1):
            for occ, t in stream[start:end]:
                eng.insert(occ, t)
            start = end
            out.append((di * 10, tracemalloc.get_traced_memory()[0] - base))
        return out
    finally:
        tracemalloc.stop()


def fig11_rows(*, graph_scale: float = 0.5, ldbc_sf: float = 0.002,
               k: int = 1_000, seed: int = 0) -> list[dict]:
    """Figure 11: live heap after every 10% of input — line-3 (RSJoin vs
    SJoin) and Q10 (RSJoin_opt vs SJoin_opt)."""
    rows = []
    cq = catalog.line_k(3)
    stream = cq.stream({"G": graph_for(graph_scale)}, seed=seed)
    for method, make in (
        ("RSJoin", lambda: RSJoin(cq.query, k, seed=seed)),
        ("SJoin", lambda: SJoin(cq.query, k, seed=seed)),
    ):
        for pct, b in _memory_deciles(make, stream):
            rows.append(dict(workload="line-3", method=method, pct=pct, bytes=b))
    cq10 = catalog.q10()
    tables = ldbc_lite(ldbc_sf, seed=seed)
    oq = cq10.opt_query()
    stream10 = cq10.stream(tables, seed=seed, opt=True)
    for method, make in (
        ("RSJoin_opt", lambda: RSJoin(oq, k, seed=seed, grouping=True)),
        ("SJoin_opt", lambda: SJoin(oq, k, seed=seed)),
    ):
        for pct, b in _memory_deciles(make, stream10):
            rows.append(dict(workload="Q10", method=method, pct=pct, bytes=b))
    return rows


# ------------------------------- Fig 12/13: RSWP vs RS (Section 6.3)


def _time_rswp(items, theta, k, seed) -> float:
    t0 = time.perf_counter()
    r = Reservoir(k, theta, seed=seed)
    r.run(ListBatch(items))
    return time.perf_counter() - t0


def _time_rs(items, theta, k, seed) -> float:
    t0 = time.perf_counter()
    classic_reservoir(items, k, theta=theta, seed=seed)
    return time.perf_counter() - t0


def fig12_rows(*, n: int = 20_000, density: float = 0.1, k: int = 200,
               length: int = 192, seed: int = 0) -> list[dict]:
    """Figure 12: cumulative RSWP vs RS time after each 10% of a
    (1/10)-dense edit-distance string stream. k/n matches the paper's 1%
    ratio so the reservoir fills at ~10% of the stream. Both samplers are
    run incrementally (one pass) and timed at each decile."""
    from repro.core.reservoir import BatchReservoir

    items, theta, _ = make_string_stream(n, density, seed=seed, length=length)
    bounds = [n * pct // 100 for pct in range(0, 101, 10)]
    rows = []
    # RSWP: Algorithm 1, the stream fed as consecutive chunks (the skip
    # budget q carries across chunk boundaries — Section 3.3).
    br = BatchReservoir(k, theta, seed=seed)
    elapsed = 0.0
    for pct, (a, b) in zip(range(10, 101, 10), zip(bounds, bounds[1:])):
        t0 = time.perf_counter()
        br.process_batch(ListBatch(items[a:b]))
        elapsed += time.perf_counter() - t0
        rows.append(dict(method="RSWP", pct=pct, seconds=elapsed))
    # RS baseline: θ evaluated on every item, classic reservoir on the reals.
    import random as _random

    rng = _random.Random(seed)
    S: list = []
    n_real = 0
    elapsed = 0.0
    for pct, (a, b) in zip(range(10, 101, 10), zip(bounds, bounds[1:])):
        t0 = time.perf_counter()
        for x in items[a:b]:
            if not theta(x):
                continue
            n_real += 1
            if len(S) < k:
                S.append(x)
            elif (j := rng.randrange(n_real)) < k:
                S[j] = x
        elapsed += time.perf_counter() - t0
        rows.append(dict(method="RS", pct=pct, seconds=elapsed))
    return rows


def fig13_rows(*, n: int = 20_000, k: int = 200, length: int = 192,
               densities: Sequence[float] | None = None, seed: int = 0) -> list[dict]:
    """Figure 13: RSWP vs RS total time across 11 stream densities."""
    densities = list(densities) if densities else [i / 10 for i in range(11)]
    rows = []
    for d in densities:
        items, theta, _ = make_string_stream(n, d, seed=seed, length=length)
        rows.append(dict(method="RSWP", density=d, seconds=_time_rswp(items, theta, k, seed)))
        rows.append(dict(method="RS", density=d, seconds=_time_rs(items, theta, k, seed)))
    return rows


# ------------------------------------------------------------------ output


def format_table(rows: list[dict]) -> str:
    """Markdown table from row dicts (uniform keys)."""
    if not rows:
        return "(no rows)"
    cols = list(rows[0])
    out = ["| " + " | ".join(cols) + " |", "|" + "---|" * len(cols)]
    for r in rows:
        cells = []
        for c in cols:
            v = r.get(c)
            cells.append(f"{v:.3f}" if isinstance(v, float) else str(v))
        out.append("| " + " | ".join(cells) + " |")
    return "\n".join(out)
