"""Reproduction of "Reservoir Sampling over Joins" (SIGMOD 2024).

Subpackages:

- ``repro.core``  — reservoir sampling algorithms (classic, skip-based,
  with-predicate, batched) and stream utilities (paper Section 3).
- ``repro.joins`` — join query model, the dynamic acyclic-join index,
  the RSJoin engine, the SJoin baseline, foreign-key and grouping
  optimizations, and the cyclic (GHD) extension (Sections 4–5).
- ``repro.datasets`` — synthetic substitutes for Epinions, TPC-DS and
  LDBC-SNB at configurable scale.
- ``repro.spark`` — PySpark embedding: batch runner, Spark-SQL ground
  truth, and a Structured Streaming stateful operator.
"""
