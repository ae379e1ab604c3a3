"""Reproduction of "Pruning in Snowflake: Working Smarter, Not Harder"
(Zimmerer et al., SIGMOD-Companion 2025) on PySpark + local Parquet.

Packages: ``core`` (the paper's pruning techniques), ``lake``
(micro-partitioned storage + manifests), ``engine`` (DataSource V2 and
pruned operators), ``workload`` (synthetic workloads + TPC-H-lite),
``experiments`` (one harness per reproduced evaluation table).
"""
