"""Table 5 (Fig. 8) — partition processing order vs top-k pruning ratio.

Runs the top-k runtime scan for the same workload under random order
("none") and metadata sort order ("sort").
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table5")
def test_table5_topk_sorting(benchmark, bench_prod_lake, results_dir):
    ours = benchmark.pedantic(
        X.table5_topk_sorting,
        args=(bench_prod_lake,),
        kwargs={"n": 150, "seed": 0},
        rounds=1,
        iterations=1,
    )
    record(results_dir, "table5_topk_sorting", X.format_table5(ours))
    # Fig. 8 shape: sorting improves the median, the mean and the lower
    # tail (worst case) of the pruning-ratio distribution.
    assert ours["sort"]["median"] >= ours["none"]["median"]
    assert ours["sort"]["mean"] > ours["none"]["mean"]
    assert ours["sort"]["p25"] >= ours["none"]["p25"]
