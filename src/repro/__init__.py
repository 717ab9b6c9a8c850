"""Reproduction of "Optimizing Queries with Many-to-Many Joins" (ICDE'25).

Subpackages:

- ``repro.core``        — join-tree IR, §3 cost model, simulator, optimizers
- ``repro.engine``      — Spark execution of the six strategies (§4)
- ``repro.bloom``       — bitvector/bloom substrate (§4.4)
- ``repro.estimation``  — m/fo estimation (§3.2)
- ``repro.ce_lite``     — CE-benchmark substitute (§5.3)
- ``repro.experiments`` — evaluation-table harnesses T1–T8 (§5)
"""
