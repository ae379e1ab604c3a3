"""Table 6 (Fig. 9) — top-k pruning ratio vs end-to-end runtime.

Executes a fixed set of top-k queries in Spark with pruning on/off and
reports the relative runtime improvement next to the pruning ratio.
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table6")
def test_table6_topk_runtime(benchmark, spark, bench_prod_lake, results_dir):
    rows = benchmark.pedantic(
        X.table6_topk_runtime,
        args=(spark, bench_prod_lake),
        kwargs={"k": 10},
        rounds=1,
        iterations=1,
    )
    record(results_dir, "table6_topk_runtime", X.format_table6(rows))
    # Fig. 9 shape: pruning ratio and runtime improvement correlate;
    # well-pruned (clustered-order) queries see large improvements.
    best = max(rows, key=lambda r: r["pruning_ratio"])
    worst = min(rows, key=lambda r: r["pruning_ratio"])
    assert best["runtime_improvement"] > 0.3
    assert best["runtime_improvement"] >= worst["runtime_improvement"] - 0.15
    assert all(r["pruning_ratio"] <= 1.0 for r in rows)
