"""Table 4 — §8.3: TPC-H prunes far less than production-like workloads.

Runs the 22-query TPC-H-lite set (clustered on l_shipdate/o_orderdate,
SF 0.1) through the same pruning flow and contrasts with Table 3.
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table4")
def test_table4_tpch_pruning(
    benchmark, bench_tpch_lake, bench_prod_lake, results_dir
):
    ours = benchmark.pedantic(
        X.table4_tpch, args=(bench_tpch_lake,), rounds=1, iterations=1
    )
    record(results_dir, "table4_tpch_pruning", X.format_table4(ours))
    # §8.3 shape: low average, much lower median (most queries barely
    # prune), and far below the production-like workload's overall ratio.
    assert 5 < ours["avg"] < 60
    assert ours["median"] < ours["avg"]
    prod = X.table3_pruning_ratios(bench_prod_lake, n=300, seed=1)
    assert prod["overall"] > 1.8 * ours["avg"], (
        "production-like workloads must prune far more than TPC-H"
    )
