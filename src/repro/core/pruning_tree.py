"""Adaptive pruning tree (§3.2): filter reordering + pruning cutoff.

Compile-time pruning evaluates a boolean tree of pruning predicates per
micro-partition.  Snowflake tracks, per tree node, the observed pruning
ratio and evaluation time, and

* **reorders** the children of AND/OR nodes — fast + highly-pruning
  children first under AND, fast + rarely-pruning (likely-to-match)
  children first under OR, so short-circuiting kicks in early;
* **cuts off** pruning for slow/ineffective nodes, but *only below an
  AND* (removing an OR branch would force the whole OR to pass every
  partition, §3.2), using the continue-vs-stop cost comparison the paper
  describes: keep pruning with a filter iff its expected per-partition
  pruning benefit (marginal prune rate × saved scan cost) exceeds its
  evaluation cost.

Cutoff only ever *widens* the retained set, so soundness (no false
negatives) is preserved by construction.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import List, Optional, Sequence

from .expr import And, Expr, Or, can_match, eval3
from .filter_pruning import PruneResult
from .stats import PartitionStats


class Node:
    """Base pruning-tree node with ratio/time accounting."""

    def __init__(self) -> None:
        self.n_evals = 0
        self.n_pruned = 0  # evaluations that returned "cannot match"
        self.total_time_s = 0.0
        self.parent: Optional["Node"] = None

    # -- statistics --------------------------------------------------------
    @property
    def prune_rate(self) -> float:
        return self.n_pruned / self.n_evals if self.n_evals else 0.0

    @property
    def avg_time_s(self) -> float:
        return self.total_time_s / self.n_evals if self.n_evals else 0.0

    def may_match(self, stats: PartitionStats) -> bool:
        t0 = time.perf_counter()
        out = self._eval(stats)
        self._record(time.perf_counter() - t0, out)
        return out

    def _record(self, dt: float, out: bool) -> None:
        self.n_evals += 1
        self.total_time_s += dt
        if not out:
            self.n_pruned += 1

    def _eval(self, stats: PartitionStats) -> bool:
        raise NotImplementedError


class LeafNode(Node):
    """A pruning predicate leaf.

    ``synthetic_cost_s`` replaces the measured wall time with a fixed
    cost (and is actually slept off when ``simulate_cost`` is set) so
    reordering/cutoff behaviour is deterministic in tests.
    """

    def __init__(
        self,
        pred: Expr,
        synthetic_cost_s: Optional[float] = None,
    ) -> None:
        super().__init__()
        self.pred = pred
        self.synthetic_cost_s = synthetic_cost_s
        self.cut = False  # halted by cutoff; treated as always-match

    def _eval(self, stats: PartitionStats) -> bool:
        try:
            return can_match(eval3(self.pred, stats))
        except (TypeError, ValueError):
            return True

    def _record(self, dt: float, out: bool) -> None:
        if self.synthetic_cost_s is not None:
            dt = self.synthetic_cost_s
        super()._record(dt, out)


class InnerNode(Node):
    def __init__(self, children: Sequence[Node]) -> None:
        super().__init__()
        self.children: List[Node] = list(children)
        for c in self.children:
            c.parent = self

    def reorder(self) -> None:
        raise NotImplementedError


class AndNode(InnerNode):
    """Conjunction: a partition is prunable if *any* child prunes it."""

    def _eval(self, stats: PartitionStats) -> bool:
        for c in self.children:
            if isinstance(c, LeafNode) and c.cut:
                continue  # halted filter: conservatively passes (§3.2)
            if not c.may_match(stats):
                return False  # short-circuit: child proved NEVER
        return True

    def reorder(self) -> None:
        # Fast and highly selective (high prune rate) first.
        self.children.sort(
            key=lambda c: -(c.prune_rate / max(c.avg_time_s, 1e-12))
        )


class OrNode(InnerNode):
    """Disjunction: prunable only if *every* child prunes."""

    def _eval(self, stats: PartitionStats) -> bool:
        for c in self.children:
            if c.may_match(stats):
                return True  # short-circuit: partition retained
        return False

    def reorder(self) -> None:
        # Fast with low selectivity (low prune rate → often matches) first.
        self.children.sort(
            key=lambda c: -((1.0 - c.prune_rate) / max(c.avg_time_s, 1e-12))
        )


def build_tree(
    pred: Expr, costs: Optional[dict] = None
) -> Node:
    """Mirror the AND/OR skeleton of ``pred`` as a pruning tree.

    Non-AND/OR subtrees become leaves.  ``costs`` optionally maps a leaf
    predicate (by identity in the original tree) to a synthetic cost.
    """
    costs = costs or {}
    if isinstance(pred, And):
        return AndNode([build_tree(a, costs) for a in pred.args])
    if isinstance(pred, Or):
        return OrNode([build_tree(a, costs) for a in pred.args])
    return LeafNode(pred, synthetic_cost_s=costs.get(id(pred)))


def _leaves(node: Node) -> List[LeafNode]:
    if isinstance(node, LeafNode):
        return [node]
    out: List[LeafNode] = []
    for c in node.children:  # type: ignore[attr-defined]
        out.extend(_leaves(c))
    return out


@dataclass
class AdaptivePruner:
    """Drives a pruning tree over a scan set with periodic adaptation.

    ``scan_cost_s`` models the per-partition cost the execution layer
    pays for a partition that pruning fails to remove (network I/O +
    scan); the §3.2 cutoff rule stops pruning with a leaf when its
    evaluation cost exceeds its expected savings:
    ``avg_time > marginal_prune_rate * scan_cost``.
    """

    root: Node
    scan_cost_s: float = 0.005
    reorder_interval: int = 32
    cutoff_interval: int = 64
    warmup: int = 32
    enable_reorder: bool = True
    enable_cutoff: bool = True
    cut_leaves: List[LeafNode] = field(default_factory=list)

    @classmethod
    def for_predicate(cls, pred: Expr, **kw) -> "AdaptivePruner":
        costs = kw.pop("costs", None)
        return cls(root=build_tree(pred, costs), **kw)

    def _maybe_adapt(self, i: int) -> None:
        if self.enable_reorder and i % self.reorder_interval == 0:
            for n in self._inner_nodes(self.root):
                n.reorder()
        if self.enable_cutoff and i % self.cutoff_interval == 0:
            self._apply_cutoff()

    def _inner_nodes(self, node: Node) -> List[InnerNode]:
        if isinstance(node, LeafNode):
            return []
        out: List[InnerNode] = [node]  # type: ignore[list-item]
        for c in node.children:  # type: ignore[attr-defined]
            out.extend(self._inner_nodes(c))
        return out

    def _apply_cutoff(self) -> None:
        for leaf in _leaves(self.root):
            if leaf.cut or leaf.n_evals < self.warmup:
                continue
            # Only below an AND may a filter be removed (§3.2, Fig. 3).
            if not isinstance(leaf.parent, AndNode):
                continue
            if leaf.avg_time_s > leaf.prune_rate * self.scan_cost_s:
                leaf.cut = True
                self.cut_leaves.append(leaf)

    def prune_scan_set(self, partitions: Sequence) -> PruneResult:
        """Prune with adaptation; returns retained ⊇ the exact result."""
        retained: List = []
        pruned: List = []
        for i, p in enumerate(partitions, start=1):
            if p.stats.row_count == 0:
                pruned.append(p)
                continue
            if self.root.may_match(p.stats):
                retained.append(p)
            else:
                pruned.append(p)
            self._maybe_adapt(i)
        return PruneResult(
            retained=retained, pruned=pruned, fully_matching=[]
        )
