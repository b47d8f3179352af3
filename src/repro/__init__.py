"""Reproduction of "PDX: A Data Layout for Vector Similarity Search"
(Kuffó, Krippner, Boncz — SIGMOD 2025) on PySpark + NumPy.

Subpackages:

- ``repro.core``     — PDX layout, distance kernels, pruners, PDXearch.
- ``repro.ivf``      — IVF index substrate (Lloyd k-means, bucket ranking).
- ``repro.search``   — exact and approximate search drivers (all layouts).
- ``repro.spark``    — DataFrame-level PDX operators (applyInPandas /
  mapInPandas), the Spark-facing surface of the reproduction.
- ``repro.analysis`` — pruning-power traces and runtime breakdowns that
  regenerate the paper's evaluation tables.
- ``repro.vecdata``  — synthetic stand-ins for the paper's 10 datasets.
"""

__all__ = ["core", "ivf", "search", "spark", "analysis", "vecdata"]
