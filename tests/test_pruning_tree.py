"""Tests for the adaptive pruning tree (§3.2): reordering + cutoff."""
import pytest

from repro.core.expr import and_, col, or_
from repro.core.filter_pruning import prune_scan_set
from repro.core.pruning_tree import (
    AdaptivePruner,
    AndNode,
    LeafNode,
    OrNode,
    build_tree,
)
from .helpers import meta


def make_parts(n=200):
    """Partitions where x prunes 90 %, y prunes 10 %, z prunes nothing."""
    return [
        meta(i, 10, x=(i, i), y=(i % 10, i % 10), z=(0, 100))
        for i in range(n)
    ]


PRED_X = col("x") >= 180  # prunes 90 % of make_parts()
PRED_Y = col("y").eq(0)  # prunes 90 % too but used as cheap filter
PRED_Z = col("z") > 50  # prunes nothing (wide ranges)


class TestTreeConstruction:
    def test_and_tree(self):
        t = build_tree(and_(PRED_X, PRED_Z))
        assert isinstance(t, AndNode) and len(t.children) == 2
        assert all(isinstance(c, LeafNode) for c in t.children)

    def test_or_tree(self):
        t = build_tree(or_(PRED_X, PRED_Z))
        assert isinstance(t, OrNode)

    def test_nested_tree_matches_paper_fig3(self):
        # (p1 OR p2) OR (p3 AND p4)
        p1, p2, p3, p4 = PRED_X, PRED_Y, PRED_Z, col("x") < 50
        t = build_tree(or_(or_(p1, p2), and_(p3, p4)))
        assert isinstance(t, OrNode)
        # or_() flattens nested ORs; the AND subtree survives as a child.
        kinds = [type(c).__name__ for c in t.children]
        assert "AndNode" in kinds

    def test_leaf_for_non_boolean_root(self):
        t = build_tree(PRED_X)
        assert isinstance(t, LeafNode)


class TestCorrectness:
    def test_matches_exact_pruning_conjunction(self):
        parts = make_parts()
        pred = and_(PRED_X, PRED_Z)
        exact = prune_scan_set(parts, pred)
        adaptive = AdaptivePruner.for_predicate(
            pred, enable_cutoff=False
        ).prune_scan_set(parts)
        assert {p.pid for p in adaptive.retained} == {
            p.pid for p in exact.retained
        }

    def test_matches_exact_pruning_disjunction(self):
        parts = make_parts()
        pred = or_(PRED_X, PRED_Y)
        exact = prune_scan_set(parts, pred)
        adaptive = AdaptivePruner.for_predicate(
            pred, enable_cutoff=False
        ).prune_scan_set(parts)
        assert {p.pid for p in adaptive.retained} == {
            p.pid for p in exact.retained
        }

    def test_cutoff_only_widens(self):
        """Soundness: cutoff may retain more partitions, never fewer."""
        parts = make_parts()
        pred = and_(PRED_X, PRED_Z)
        exact = prune_scan_set(parts, pred)
        # Aggressive cutoff: tiny scan cost makes every filter "slow".
        pruner = AdaptivePruner.for_predicate(pred, scan_cost_s=1e-12)
        adaptive = pruner.prune_scan_set(parts)
        assert {p.pid for p in exact.retained} <= {
            p.pid for p in adaptive.retained
        }


class TestReordering:
    def test_and_puts_effective_filter_first(self):
        parts = make_parts()
        costs = {}
        pred = and_(PRED_Z, PRED_X)  # ineffective filter listed first
        tree = build_tree(pred)
        # Make both filters equally fast so ordering is ratio-driven.
        for leaf in tree.children:
            leaf.synthetic_cost_s = 1e-6
        pruner = AdaptivePruner(
            root=tree, enable_cutoff=False, reorder_interval=16
        )
        pruner.prune_scan_set(parts)
        first = pruner.root.children[0]
        assert first.pred == PRED_X, "high-prune-rate filter should lead"

    def test_or_puts_matching_filter_first(self):
        parts = make_parts()
        pred = or_(PRED_X, PRED_Z)  # Z matches everything -> short-circuits
        tree = build_tree(pred)
        for leaf in tree.children:
            leaf.synthetic_cost_s = 1e-6
        pruner = AdaptivePruner(
            root=tree, enable_cutoff=False, reorder_interval=16
        )
        pruner.prune_scan_set(parts)
        first = pruner.root.children[0]
        assert first.pred == PRED_Z, "low-prune-rate filter should lead OR"

    def test_fast_filter_preferred_at_equal_ratio(self):
        # Directly exercise the scoring: equal observed prune rate,
        # different cost -> cheaper child leads the AND.
        slow, fast = LeafNode(PRED_X), LeafNode(PRED_Y)
        for leaf, t in ((slow, 1e-1), (fast, 1e-4)):
            leaf.n_evals, leaf.n_pruned, leaf.total_time_s = 100, 50, t
        root = AndNode([slow, fast])
        root.reorder()
        assert root.children[0] is fast


class TestCutoff:
    def test_ineffective_and_child_is_cut(self):
        parts = make_parts(400)
        pred = and_(PRED_X, PRED_Z)
        tree = build_tree(pred)
        # Z prunes nothing and is expensive; X prunes 90 % and is cheap.
        for leaf in tree.children:
            leaf.synthetic_cost_s = 1e-6 if leaf.pred == PRED_X else 5e-3
        pruner = AdaptivePruner(root=tree, scan_cost_s=1e-4, warmup=16)
        pruner.prune_scan_set(parts)
        cut_preds = {leaf.pred for leaf in pruner.cut_leaves}
        assert PRED_Z in cut_preds
        assert PRED_X not in cut_preds

    def test_or_children_never_cut(self):
        """§3.2: removing an OR branch would disable the whole OR."""
        parts = make_parts(400)
        pred = or_(PRED_X, PRED_Z)
        tree = build_tree(pred)
        for leaf in tree.children:
            leaf.synthetic_cost_s = 5e-3  # absurdly slow: prime cut target
        pruner = AdaptivePruner(root=tree, scan_cost_s=1e-9, warmup=16)
        pruner.prune_scan_set(parts)
        assert pruner.cut_leaves == []

    def test_and_below_or_cut_allowed(self):
        # Fig. 3: p3/p4 under the AND may be cut even when the root is OR.
        p4 = col("x") < 50
        pred = or_(PRED_Y, and_(PRED_Z, p4))
        parts = make_parts(400)
        tree = build_tree(pred)
        for node in tree.children:
            if isinstance(node, AndNode):
                for leaf in node.children:
                    leaf.synthetic_cost_s = 5e-3
            else:
                node.synthetic_cost_s = 1e-6
        pruner = AdaptivePruner(root=tree, scan_cost_s=1e-9, warmup=16)
        pruner.prune_scan_set(parts)
        assert pruner.cut_leaves, "AND children below an OR are cuttable"

    def test_cut_filter_still_conservative(self):
        """After cutoff the cut leaf passes every partition (§3.2)."""
        leaf = LeafNode(PRED_X, synthetic_cost_s=1.0)
        other = LeafNode(PRED_Z, synthetic_cost_s=1e-9)
        root = AndNode([leaf, other])
        leaf.cut = True
        parts = make_parts(10)
        # x >= 180 would prune pid 0..9, but the cut leaf must pass them.
        assert all(root.may_match(p.stats) for p in parts)


class TestStatsTracking:
    def test_prune_rate_and_time_recorded(self):
        leaf = LeafNode(PRED_X, synthetic_cost_s=2e-6)
        parts = make_parts(200)
        for p in parts:
            leaf.may_match(p.stats)
        assert leaf.n_evals == 200
        assert leaf.prune_rate == pytest.approx(0.9)
        assert leaf.avg_time_s == pytest.approx(2e-6)
