"""Table 3 — headline per-technique pruning ratios (§9, Figs. 1/4/10).

Runs the full §7 pruning flow (filter → join → LIMIT → top-k) over an
800-query production-like mix at benchmark scale.
"""
import pytest

from repro import experiments as X
from .conftest import record


@pytest.mark.benchmark(group="table3")
def test_table3_pruning_ratios(benchmark, bench_prod_lake, results_dir):
    ours = benchmark.pedantic(
        X.table3_pruning_ratios,
        args=(bench_prod_lake,),
        kwargs={"n": 800, "seed": 0},
        rounds=1,
        iterations=1,
    )
    record(results_dir, "table3_pruning_ratios", X.format_table3(ours))
    # Shape claims from the conclusion: every technique achieves a
    # substantial (>60 %) mean ratio where applied, and the platform-wide
    # partition-weighted ratio is high.
    for tech in ("filter", "limit", "topk", "join"):
        assert ours[tech] > 60, tech
    assert ours["overall"] > 70
    # Fig. 4 tails: a sizeable zero-pruning population coexists with a
    # sizeable >=90 % population.
    assert ours["fig4_pct_queries_zero"] > 10
    assert ours["fig4_pct_queries_ge90"] > 25
