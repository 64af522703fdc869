"""Reproduction of "Correlation Sketches for Approximate Join-Correlation
Queries" (Santos et al., SIGMOD 2021) on PySpark.

Package layout (see DESIGN.md):

- :mod:`repro.core` — hashing, the local sketch builder, correlation
  estimators, confidence bounds, and KMV cardinality statistics.
- :mod:`repro.datagen` — seeded synthetic data: SBN pairs and NYC/WBF-like
  open-data collections.
- :mod:`repro.sparkflow` — Spark DataFrame dataflows: sketch construction
  over a collection, sketch joins, and full-join ground truth.
- :mod:`repro.ranking` — scoring functions (s1..s4, jc, ĵc, random) and
  ranking metrics (MAP, nDCG).
- :mod:`repro.index` — in-memory inverted index over hashed keys (§5.5).
- :mod:`repro.exp` — experiment harnesses for the paper's tables.
"""
