"""Reproduction of "Butterfly-Core Community Search over Labeled
Graphs" (Dong et al., PVLDB 14(1), 2021) as a PySpark codebase.

Subpackages: ``graphlib`` (distributed Spark-DataFrame graph tier),
``local`` (driver-tier twin + k-truss), ``core`` (the paper's BCC
model and algorithms), ``baselines`` (CTC, PSA), ``eval`` (datasets,
queries, metrics, experiment runners). See DESIGN.md.
"""
