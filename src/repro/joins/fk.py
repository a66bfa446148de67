"""Foreign-key combining optimization (Section 4.4, "Foreign-keys").

When ``R_i ⋈_X R_j`` is a foreign-key join into the primary key ``X`` of
``R_j``, the pair is combined into a single relation ``R_ij = R_i ⋈ R_j``
(recursively until no FK join remains); RSJoin_opt / SJoin_opt then run the
plain engines on the combined (smaller) query.

The streaming subtlety the paper notes: a base ("many"-side) tuple can arrive
*before* its dimension tuples. :class:`FKCombiner` is the event-driven
resolver — base tuples block on their first missing lookup and are resumed
when the dimension row arrives, so each combined tuple is emitted exactly
when its last constituent arrives (preserving the delta-stream semantics the
reservoir needs).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Mapping, Sequence

from repro.joins.query import JoinQuery, Relation


@dataclass(frozen=True)
class Lookup:
    """One FK hop: probe ``table`` by primary key ``table_key_col`` with the
    value of ``key_attr`` in the partial tuple; append ``carry`` columns."""

    key_attr: str
    table: str
    table_key_col: str
    carry: tuple[tuple[str, str], ...] = ()  # (dim column, new attribute)


@dataclass(frozen=True)
class CombinedRelation:
    """A combined relation: a streaming base table plus a chain/tree of FK
    lookups (each keyed on an attribute produced earlier)."""

    occ: str
    base_table: str
    base_cols: tuple[tuple[str, str], ...]  # (base column, attribute)
    lookups: tuple[Lookup, ...] = ()

    @property
    def attrs(self) -> tuple[str, ...]:
        out = [a for _, a in self.base_cols]
        for lk in self.lookups:
            out.extend(a for _, a in lk.carry)
        return tuple(out)

    def relation(self) -> Relation:
        return Relation(self.occ, self.attrs)


def combined_query(specs: Sequence[CombinedRelation]) -> JoinQuery:
    return JoinQuery(s.relation() for s in specs)


class FKCombiner:
    """Turns base-table row events into combined-occurrence stream tuples."""

    def __init__(self, specs: Sequence[CombinedRelation]):
        self.specs = tuple(specs)
        # dim store per (spec index, lookup index): key value -> carried values
        self._dims: list[list[dict]] = [[{} for _ in s.lookups] for s in self.specs]
        # blocked partial tuples: (spec idx, lookup idx, key) -> [state dict]
        self._pending: dict[tuple, list[dict]] = {}
        self._base_of: dict[str, list[int]] = {}
        self._dim_of: dict[str, list[tuple[int, int]]] = {}
        for si, s in enumerate(self.specs):
            self._base_of.setdefault(s.base_table, []).append(si)
            for li, lk in enumerate(s.lookups):
                self._dim_of.setdefault(lk.table, []).append((si, li))

    def feed(self, table: str, row: Mapping) -> list[tuple[str, tuple]]:
        """Process one base-table row arrival; returns emitted
        (occurrence, tuple) stream items (possibly several, possibly none)."""
        out: list[tuple[str, tuple]] = []
        for si, li in self._dim_of.get(table, ()):
            lk = self.specs[si].lookups[li]
            key = row[lk.table_key_col]
            store = self._dims[si][li]
            if key in store:
                continue  # set semantics: PK rows are unique
            store[key] = tuple(row[c] for c, _ in lk.carry)
            for state in self._pending.pop((si, li, key), ()):  # resume
                self._resolve(si, state, li, out)
        for si in self._base_of.get(table, ()):
            s = self.specs[si]
            state = {a: row[c] for c, a in s.base_cols}
            self._resolve(si, state, 0, out)
        return out

    def _resolve(self, si: int, state: dict, li: int, out: list) -> None:
        s = self.specs[si]
        while li < len(s.lookups):
            lk = s.lookups[li]
            key = state[lk.key_attr]
            store = self._dims[si][li]
            vals = store.get(key)
            if vals is None:
                self._pending.setdefault((si, li, key), []).append(state)
                return
            for (_, attr), v in zip(lk.carry, vals):
                state[attr] = v
            li += 1
        out.append((s.occ, tuple(state[a] for a in s.attrs)))
