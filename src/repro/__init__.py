"""Reproduction of "Accelerating Partial Evaluation in Distributed SPARQL
Query Evaluation" (Peng, Zou, Guan — ICDE 2019) on PySpark.

Packages: :mod:`repro.core` (the paper's contribution: partial evaluation,
LEC features, pruning, assembly, candidates, engine), :mod:`repro.rdf`
(distributed RDF graph substrate, partitioners, cost model, datasets),
:mod:`repro.tables` (Tables I–IV harness), :mod:`repro.oracle` /
:mod:`repro.oracle_bgp` (DuckDB correctness oracle).
"""
