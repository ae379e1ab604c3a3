"""Table 1 — relative frequency of LIMIT-query types.

Benchmarks generating a 20 000-query SELECT mix and classifying every
SQL text; asserts the recovered frequencies match the paper's Table 1.
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table1")
def test_table1_workload_mix(benchmark, bench_prod_lake, results_dir):
    ours = benchmark.pedantic(
        X.table1_workload_mix,
        args=(bench_prod_lake,),
        kwargs={"n": 20_000, "seed": 0},
        rounds=1,
        iterations=1,
    )
    record(results_dir, "table1_workload_mix", X.format_table1(ours))
    # Shape: the classifier recovers the Table 1 marginals from raw SQL.
    assert ours["limit_total"] == pytest.approx(
        X.PAPER_TABLE1["limit_total"], abs=0.6
    )
    assert ours["topk_total"] == pytest.approx(
        X.PAPER_TABLE1["topk_total"], abs=0.8
    )
    assert ours["topk_plain"] > ours["topk_group_agg"] > ours["topk_group_key"]
