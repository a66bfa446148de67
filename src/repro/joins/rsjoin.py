"""RSJoin — reservoir sampling over acyclic joins (Algorithm 6).

For every relation occurrence ``r`` the engine keeps a :class:`TreeIndex` on
the join tree rooted at ``r`` (Section 4.3: the tree rooted at ``r`` generates
the batch for tuples inserted into ``R_r``). Processing a stream tuple is:

1. update all rooted-tree indexes (``O(log N)`` amortized each);
2. form the lazy batch ``ΔJ ⊇ ΔQ(R, t)`` from the tree rooted at the tuple's
   relation;
3. feed it to the predicate-enabled batched reservoir (Algorithms 4/5) with
   ``θ = isReal``.

``grouping=True`` enables the Section 4.4 grouping optimization;
``full_index=True`` additionally maintains the structures needed to draw a
uniform sample of the *current* ``Q(R)`` at any time (Theorem 4.2 op. 2);
``sampling=False`` turns step 2/3 off (used by the Fig 6 update-time
experiment).
"""
from __future__ import annotations

import random
from typing import Iterable, Sequence

from repro.core.reservoir import BatchReservoir
from repro.joins.index import DeltaBatch, TreeIndex, is_real
from repro.joins.query import JoinQuery


class RSJoin:
    """The paper's algorithm (called RSJoin / RSJoin_opt in Section 6)."""

    def __init__(
        self,
        query: JoinQuery,
        k: int,
        *,
        seed: int = 0,
        grouping: bool = False,
        full_index: bool = False,
        sampling: bool = True,
    ):
        self.query = query
        self.k = k
        self.sampling = sampling
        self._full_tree_name = query.relations[0].name
        self.trees: dict[str, TreeIndex] = {
            r.name: TreeIndex(
                query.rooted(r.name),
                grouping=grouping,
                full_index=(full_index and r.name == self._full_tree_name),
            )
            for r in query.relations
        }
        self.seen: dict[str, set] = {r.name: set() for r in query.relations}
        self.sampler = BatchReservoir(k, is_real, rng=random.Random(seed))
        self.n_inserted = 0
        self.total_delta = 0  # Σ |ΔJ| — size of the simulated result stream

    # ------------------------------------------------------------- stream

    def insert(self, rel_name: str, values: Sequence) -> None:
        """Process one stream tuple (set semantics: duplicates are no-ops)."""
        t = tuple(values)
        bucket = self.seen[rel_name]
        if t in bucket:
            return
        bucket.add(t)
        self.n_inserted += 1
        for tree in self.trees.values():
            tree.insert(rel_name, t)
        if not self.sampling:
            return
        batch = DeltaBatch(self.trees[rel_name], t)
        self.total_delta += batch.total
        self.sampler.process_batch(batch)

    def run(self, stream: Iterable[tuple[str, Sequence]]) -> "RSJoin":
        for rel_name, values in stream:
            self.insert(rel_name, values)
        return self

    # ------------------------------------------------------------- results

    @property
    def sample(self) -> list[tuple]:
        """Current reservoir: ≤ k uniform samples (tuples over query.attrs)."""
        return list(self.sampler.sample)

    def draw(self, rng: random.Random | None = None) -> tuple | None:
        """One fresh uniform sample of the current Q(R) (needs full_index)."""
        return self.trees[self._full_tree_name].draw_full(rng or random.Random())

    @property
    def prop_count(self) -> int:
        """Total executions of the Algorithm 7/10 propagation loop (Fig 9)."""
        return sum(t.prop_count for t in self.trees.values())
