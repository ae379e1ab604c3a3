"""Table 2 — LIMIT-pruning applicability breakdown.

Runs LIMIT pruning (filter pass + inverted fully-matching pass +
minimal-cover construction) for a 1 000-query LIMIT workload and
buckets the outcomes per the paper's Table 2.
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table2")
def test_table2_limit_breakdown(benchmark, bench_prod_lake, results_dir):
    ours = benchmark.pedantic(
        X.table2_limit_breakdown,
        args=(bench_prod_lake,),
        kwargs={"n": 1_000, "seed": 0},
        rounds=1,
        iterations=1,
    )
    record(results_dir, "table2_limit_breakdown", X.format_table2(ours))
    # Shape claims from §4.4: most queries already minimal; with-predicate
    # queries are dominated by unsupported/non-fully-matching shapes; when
    # pruning applies it almost always reaches a single partition.
    assert ours["without"]["already_minimal"] > 70
    assert ours["with"]["already_minimal"] > 40
    assert ours["with"]["unsupported_shape"] > ours["with"]["pruned_to_1"]
    for g in ("without", "with", "overall"):
        assert ours[g]["pruned_to_1"] > ours[g]["pruned_to_gt1"]
