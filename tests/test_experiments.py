"""Unit-scale runs of every experiment harness (full-scale versions are
the benchmarks): each must produce well-formed, shape-consistent rows."""
import pytest

from repro import experiments as X


@pytest.fixture(scope="module")
def tables(prod_lake):
    return prod_lake


class TestTable1:
    def test_frequencies_sum_consistently(self, tables):
        t = X.table1_workload_mix(tables, n=4000, seed=3)
        assert t["limit_total"] == pytest.approx(
            t["limit_no_pred"] + t["limit_pred"]
        )
        assert t["topk_total"] == pytest.approx(
            t["topk_plain"] + t["topk_group_key"] + t["topk_group_agg"]
        )

    def test_close_to_paper_at_moderate_n(self, tables):
        t = X.table1_workload_mix(tables, n=8000, seed=1)
        assert t["limit_total"] == pytest.approx(2.60, abs=1.0)
        assert t["topk_total"] == pytest.approx(5.55, abs=1.5)

    def test_format(self, tables):
        t = X.table1_workload_mix(tables, n=1000, seed=0)
        out = X.format_table1(t)
        assert "LIMIT queries" in out and "paper" in out


class TestTable2:
    def test_buckets_sum_to_100(self, tables):
        t = X.table2_limit_breakdown(tables, n=300, seed=2)
        for g in ("without", "with", "overall"):
            assert sum(t[g].values()) == pytest.approx(100.0)

    def test_minimal_dominates(self, tables):
        t = X.table2_limit_breakdown(tables, n=300, seed=2)
        assert t["overall"]["already_minimal"] > 40

    def test_format(self, tables):
        t = X.table2_limit_breakdown(tables, n=100, seed=0)
        assert "already minimal" in X.format_table2(t)


class TestTable3:
    @pytest.fixture(scope="class")
    def t3(self, tables):
        return X.table3_pruning_ratios(tables, n=250, seed=4)

    def test_all_ratios_in_range(self, t3):
        for k in ("filter", "limit", "topk", "join", "overall"):
            assert 0.0 <= t3[k] <= 100.0

    def test_substantial_pruning(self, t3):
        assert t3["filter"] > 60
        assert t3["overall"] > 50

    def test_counts_recorded(self, t3):
        assert t3["n_topk"] > 0 and t3["n_join"] > 0

    def test_format(self, t3):
        assert "overall partitions pruned" in X.format_table3(t3)


class TestTable4:
    @pytest.fixture(scope="class")
    def t4(self, tpch_lake):
        return X.table4_tpch(tpch_lake)

    def test_22_queries(self, t4):
        assert len(t4["per_query"]) == 22

    def test_median_below_average(self, t4):
        assert t4["median"] <= t4["avg"]

    def test_far_below_production(self, tables, t4):
        t3 = X.table3_pruning_ratios(tables, n=200, seed=5)
        assert t3["overall"] > t4["avg"] + 20

    def test_format(self, t4):
        out = X.format_table4(t4)
        assert "q6" in out and "average" in out


class TestTable5:
    def test_sort_beats_none(self, tables):
        t = X.table5_topk_sorting(tables, n=60, seed=0,
                                  min_scan_partitions=4)
        assert t["sort"]["mean"] >= t["none"]["mean"]

    def test_format(self, tables):
        t = X.table5_topk_sorting(tables, n=40, seed=1,
                                  min_scan_partitions=4)
        assert "Strategy" in X.format_table5(t)


class TestTable6:
    def test_rows_and_improvement(self, spark, tables):
        rows = X.table6_topk_runtime(spark, tables, k=5)
        assert len(rows) == 5
        best = max(rows, key=lambda r: r["pruning_ratio"])
        assert best["runtime_improvement"] > 0.0
        assert "improv" in X.format_table6(rows)
