"""Generate SQL for a JoinQuery so results can be cross-checked on DuckDB
(`repro.oracle`) and Spark SQL (`repro.spark.runner`) from the same text."""
from __future__ import annotations

from typing import Mapping, Sequence

from repro.joins.query import JoinQuery


def query_sql(
    query: JoinQuery,
    sources: Mapping[str, tuple[str, Sequence[str]]],
    *,
    dialect_quote: str = "",
) -> str:
    """SELECT/FROM/WHERE text for the natural join.

    ``sources`` maps each relation occurrence to ``(table_name, columns)``
    where ``columns[i]`` is the table column providing attribute
    ``query.by_name[occ].attrs[i]``. Output columns are aliased to the
    query's attribute names (identical on both comparison sides, as the
    oracle requires).
    """
    col_of: dict[str, dict[str, str]] = {}
    for occ, (_, cols) in sources.items():
        rel = query.by_name[occ]
        if len(cols) != len(rel.attrs):
            raise ValueError(f"{occ}: {len(cols)} columns for {len(rel.attrs)} attrs")
        col_of[occ] = dict(zip(rel.attrs, cols))
    qd = dialect_quote
    select = []
    for a in query.attrs:
        occ = next(r.name for r in query.relations if a in r.attrs)
        select.append(f"{occ}.{qd}{col_of[occ][a]}{qd} AS {qd}{a}{qd}")
    frm = [f"{sources[r.name][0]} AS {r.name}" for r in query.relations]
    where = []
    for a in query.attrs:
        occs = [r.name for r in query.relations if a in r.attrs]
        first = occs[0]
        for other in occs[1:]:
            where.append(
                f"{first}.{qd}{col_of[first][a]}{qd} = {other}.{qd}{col_of[other][a]}{qd}"
            )
    sql = f"SELECT {', '.join(select)} FROM {', '.join(frm)}"
    if where:
        sql += f" WHERE {' AND '.join(where)}"
    return sql
