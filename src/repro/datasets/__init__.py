"""Synthetic substitutes for the paper's datasets (see DESIGN.md):
Epinions → power-law graph, TPC-DS → tpcds_lite, LDBC-SNB → ldbc_lite."""

from repro.datasets.graph import epinions_lite, power_law_edges  # noqa: F401
from repro.datasets.ldbc import ldbc_lite  # noqa: F401
from repro.datasets.tpcds import tpcds_lite  # noqa: F401
