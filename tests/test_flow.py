"""Integration tests for the combined pruning flow (§7)."""
import datetime as dt

import pytest

from repro.core import query as q
from repro.core.expr import between, col, to_spark
from repro.core.flow import run_pruning_flow
from repro.core.topk_pruning import PlanOp


@pytest.fixture(scope="module")
def tables(prod_lake):
    return prod_lake


class TestFilterStage:
    def test_filter_applied_on_clustered_pred(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="events",
            pred=col("ts") >= dt.date(2025, 1, 15),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["filter"].eligible
        assert r.techniques["filter"].applied
        assert r.overall_ratio > 0.8

    def test_no_pred_not_eligible(self, tables):
        spec = q.QuerySpec(qtype=q.SELECT, table="events")
        r = run_pruning_flow(spec, tables)
        assert not r.techniques["filter"].eligible
        assert r.overall_ratio == 0.0

    def test_unclustered_pred_eligible_but_not_applied(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="blob", pred=col("cat").eq("A")
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["filter"].eligible
        assert not r.techniques["filter"].applied


class TestJoinStage:
    def test_correlated_join_prunes_probe(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="events",
            join=q.JoinSpec(
                build_table="incidents", build_key="event_id",
                probe_key="event_id",
                build_pred=col("severity") >= 3,
            ),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["join"].eligible
        assert r.techniques["join"].applied
        assert r.techniques["join"].ratio > 0.5

    def test_empty_build_side_prunes_all(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="events",
            join=q.JoinSpec(
                build_table="incidents", build_key="event_id",
                probe_key="event_id",
                build_pred=col("severity") >= 999,
            ),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["join"].ratio == 1.0
        assert r.final_main_scan == []

    def test_uncorrelated_join_prunes_nothing(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="events",
            join=q.JoinSpec(
                build_table="users", build_key="user_id",
                probe_key="user_id",
                build_pred=between(col("user_id"), 10, 60),
            ),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["join"].eligible
        # events.user_id is uncorrelated with layout: wide ranges remain.
        assert not r.techniques["join"].applied


class TestLimitStage:
    def test_limit_pruning_applies(self, tables):
        spec = q.QuerySpec(
            qtype=q.LIMIT, table="events",
            pred=between(col("ts"), dt.date(2024, 3, 1), dt.date(2024, 6, 1)),
            k=10,
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["limit"].eligible
        assert r.techniques["limit"].applied
        assert len(r.final_main_scan) == 1
        assert r.limit_outcome.category == "pruned_to_1"

    def test_limit_unsupported_shape(self, tables):
        spec = q.QuerySpec(
            qtype=q.LIMIT, table="events",
            pred=between(col("ts"), dt.date(2024, 3, 1), dt.date(2024, 6, 1)),
            k=10, limit_shape_supported=False,
        )
        r = run_pruning_flow(spec, tables)
        assert r.limit_outcome.category == "unsupported_shape"
        assert not r.techniques["limit"].applied

    def test_limit_result_correct(self, spark, tables):
        """The pruned scan still yields >= k qualifying rows."""
        pred = between(col("ts"), dt.date(2024, 3, 1), dt.date(2024, 6, 1))
        spec = q.QuerySpec(qtype=q.LIMIT, table="events", pred=pred, k=10)
        r = run_pruning_flow(spec, tables)
        df = tables["events"].scan(spark, r.final_main_scan)
        assert df.filter(to_spark(pred)).count() >= 10


class TestTopKStage:
    def test_topk_on_clustered_order_col(self, tables):
        spec = q.QuerySpec(
            qtype=q.TOPK, table="events", k=10, order_col="ts", desc=True,
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["topk"].eligible
        assert r.techniques["topk"].applied
        assert r.techniques["topk"].ratio > 0.7

    def test_topk_group_agg_not_eligible(self, tables):
        spec = q.QuerySpec(
            qtype=q.TOPK_GROUP_AGG, table="events", k=5,
            order_col=None, group_cols=("country",),
            agg_fn="sum", agg_col="amount",
            plan_ops=(PlanOp("groupby", group_keys=("country",)),),
        )
        r = run_pruning_flow(spec, tables)
        assert not r.techniques["topk"].eligible

    def test_topk_after_filter(self, tables):
        spec = q.QuerySpec(
            qtype=q.TOPK, table="events", k=5, order_col="ts",
            pred=col("etype").eq("click"),
            plan_ops=(PlanOp("filter"),),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["topk"].eligible
        assert r.overall_ratio > 0.5

    def test_topk_random_strategy_runs(self, tables):
        spec = q.QuerySpec(
            qtype=q.TOPK, table="events", k=10, order_col="amount",
        )
        r = run_pruning_flow(spec, tables, topk_strategy="random")
        assert r.techniques["topk"].eligible


class TestCombined:
    def test_three_techniques_on_one_query(self, tables):
        """§6.1's guiding example: filter + join + top-k on one query."""
        spec = q.QuerySpec(
            qtype=q.TOPK, table="events", k=3, order_col="ts",
            pred=col("ts") >= dt.date(2024, 10, 1),
            join=q.JoinSpec(
                build_table="incidents", build_key="event_id",
                probe_key="event_id",
                build_pred=col("severity") >= 2,
            ),
            plan_ops=(
                PlanOp("filter"),
                PlanOp("join", order_col_from_probe=True),
            ),
        )
        r = run_pruning_flow(spec, tables)
        assert r.techniques["filter"].applied
        assert r.techniques["topk"].eligible
        assert r.overall_ratio > 0.5

    def test_total_partitions_counts_both_sides(self, tables):
        spec = q.QuerySpec(
            qtype=q.SELECT, table="events",
            join=q.JoinSpec(
                build_table="incidents", build_key="event_id",
                probe_key="event_id",
            ),
        )
        r = run_pruning_flow(spec, tables)
        n_ev = tables["events"].manifest.n_partitions
        n_inc = tables["incidents"].manifest.n_partitions
        assert r.total_partitions == n_ev + n_inc

    def test_flow_execution_matches_unpruned(self, spark, tables):
        """Post-flow scan set + Spark filter == unpruned filter result."""
        pred = col("ts") >= dt.date(2025, 1, 1)
        spec = q.QuerySpec(qtype=q.SELECT, table="events", pred=pred)
        r = run_pruning_flow(spec, tables)
        pruned = (
            tables["events"].scan(spark, r.final_main_scan)
            .filter(to_spark(pred)).count()
        )
        full = tables["events"].full(spark).filter(to_spark(pred)).count()
        assert pruned == full
