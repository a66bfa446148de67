"""Core sampling algorithms from Section 3 of the paper."""

from repro.core.reservoir import (  # noqa: F401
    BatchReservoir,
    ListBatch,
    Reservoir,
    classic_reservoir,
    reservoir_with_predicate,
    skip_reservoir,
)
