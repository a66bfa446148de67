"""Brute-force reference implementations used by tests (never by the engines)."""
from __future__ import annotations

from typing import Mapping, Sequence

from repro.joins.query import JoinQuery


def brute_force_join(
    query: JoinQuery, tables: Mapping[str, Sequence[tuple]]
) -> set[tuple]:
    """All join results as tuples over ``query.attrs`` (natural-join, set
    semantics), via a simple left-deep hash join."""
    attrs = query.attrs
    partials: list[dict] = [{}]
    for rel in query.relations:
        rows = tables.get(rel.name, [])
        new: list[dict] = []
        for p in partials:
            for row in rows:
                d = dict(zip(rel.attrs, row))
                if all(p.get(a, v) == v for a, v in d.items()):
                    m = dict(p)
                    m.update(d)
                    new.append(m)
        partials = new
        if not partials:
            return set()
    return {tuple(p[a] for a in attrs) for p in partials}


def brute_force_delta(
    query: JoinQuery,
    tables: Mapping[str, Sequence[tuple]],
    rel_name: str,
    t: tuple,
) -> set[tuple]:
    """ΔQ(R, t): join results that use exactly ``t`` at occurrence
    ``rel_name`` (with ``t`` assumed already present in ``tables``)."""
    pinned = dict(tables)
    pinned[rel_name] = [t]
    return brute_force_join(query, pinned)
