"""Execution layer: pruned scan sets → Spark DataFrames.

``datasource`` registers the ``lakescan`` Python DataSource whose
``pushFilters`` hook performs manifest min/max pruning inside Catalyst's
pushdown phase; ``exec_ops`` contains DataFrame-level operators (top-k
over a pruned scan set, pruned hash join) used by tests and benchmarks.
"""
