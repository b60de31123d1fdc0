"""Reproduction of "Time Constrained Continuous Subgraph Search over
Streaming Graphs" (Li, Zou, Özsu, Zhao — ICDE 2019) on PySpark.

Subpackages: ``core`` (query model, engines, MS-tree, golden SQL),
``decompose`` (§VI), ``baselines`` (SJ-tree, IncMat), ``concurrency``
(§V), ``datagen`` (streams + §VII-B queries), ``experiments`` (tables
T15…T25). See DESIGN.md / EXPERIMENTS.md at the repo root.
"""
