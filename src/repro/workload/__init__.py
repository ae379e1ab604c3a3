"""Synthetic workload substrate.

The paper's evaluation runs over private Snowflake production workloads;
this package re-creates (a) production-*like* lake tables whose layouts
model common real-world patterns (time-clustered facts, id-clustered
dimensions, correlated build sides, unclustered noise), (b) a query
generator parameterized by the paper's published workload statistics
(Table 1 frequencies, Fig. 6 k-distribution, high-selectivity
predicates), (c) the SQL-text classifier used to derive Table 1, and
(d) a TPC-H-lite query set for the §8.3 comparison.
"""
