"""Spark layer: distributed Phase 1 + per-partition Phase 2.

Phase 1 (*Data Transformation*) is expressed in DataFrame / Spark SQL
operations so Catalyst owns the plan: symbolization is a projection,
granule assignment is integer arithmetic, and event-instance extraction
is a gaps-and-islands window aggregation. Results are cross-checked
against DuckDB by the oracle tests.

Phase 2 (*STPM*) is an inherently pointer-chasing hash-table algorithm
(HLH structures), so — per the single-node-parallelizable layering — the
time-series collection is partitioned by replica ``group`` key and the
pure-Python miner with all its pruning runs per partition inside
``applyInPandas``. DESIGN.md § Layering explains why a JVM operator is
out of scope.
"""
