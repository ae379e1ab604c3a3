"""LIMIT pruning (§4): scan only enough fully-matching partitions.

If the fully-matching partitions (identified by extending filter pruning
with a second, inverted-predicate pass, §4.2) together hold at least
``k`` rows, the scan set shrinks to the minimal number of fully-matching
partitions covering ``k`` — globally IO-optimal for supported queries.
Otherwise the scan set is merely *reordered* to start with
fully-matching partitions (faster time-to-k, §4.1).

Outcome categories mirror Table 2 of the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence

from .expr import Expr, can_match, columns, eval3, invert
from .filter_pruning import PruneResult, prune_scan_set
from .stats import PartitionStats

# Table 2 outcome categories (NO_FULLY_MATCHING is folded into
# "unsupported shapes" when reporting, matching the paper's text).
ALREADY_MINIMAL = "already_minimal"
UNSUPPORTED_SHAPE = "unsupported_shape"
NO_FULLY_MATCHING = "no_fully_matching"
PRUNED_TO_1 = "pruned_to_1"
PRUNED_TO_GT1 = "pruned_to_gt1"


def fully_matching_by_inverted_pass(
    partitions: Sequence, pred: Expr
) -> List:
    """§4.2 verbatim: a second pruning pass with the inverted predicate.

    A partition is fully-matching iff the inverted predicate provably
    matches *no* row.  SQL's three-valued logic adds one guard the paper
    leaves implicit: a row where the predicate is NULL fails both the
    predicate and its inversion, so null-freeness of the referenced
    columns must be required on top of the inverted-pass result.
    """
    inv = invert(pred)
    cols = columns(pred)
    out = []
    for p in partitions:
        if p.stats.row_count == 0:
            continue
        if _has_nulls(p.stats, cols):
            continue
        try:
            if not can_match(eval3(inv, p.stats)):
                out.append(p)
        except (TypeError, ValueError):
            continue
    return out


def _has_nulls(stats: PartitionStats, cols) -> bool:
    for c in cols:
        cs = stats.col(c)
        if cs is None or cs.null_count > 0:
            return True
    return False


@dataclass
class LimitPruneOutcome:
    """Result of LIMIT pruning one table scan."""

    category: str
    scan_set: List  # ordered: fully-matching first when not pruned
    filter_result: PruneResult
    k: int

    @property
    def reported_category(self) -> str:
        """Table 2 bucket (merges the two non-prunable reasons)."""
        if self.category == NO_FULLY_MATCHING:
            return UNSUPPORTED_SHAPE
        return self.category

    @property
    def pruning_ratio(self) -> float:
        """Partitions removed relative to the post-filter scan set."""
        before = len(self.filter_result.retained)
        return 1.0 - len(self.scan_set) / before if before else 0.0


def prune_for_limit(
    partitions: Sequence,
    pred: Optional[Expr],
    k: int,
    *,
    shape_supported: bool = True,
) -> LimitPruneOutcome:
    """Apply LIMIT pruning after filter pruning (§4.1's algorithm).

    ``shape_supported=False`` models queries where the LIMIT cannot be
    pushed down to this table scan (aggregations, most joins, …; §4.3).
    """
    fr = prune_scan_set(partitions, pred)
    fully = sorted(fr.fully_matching, key=lambda p: -p.row_count)
    partial = [p for p in fr.retained if p not in fr.fully_matching]

    if not shape_supported:
        return LimitPruneOutcome(UNSUPPORTED_SHAPE, fully + partial, fr, k)

    if len(fr.retained) <= 1:
        return LimitPruneOutcome(ALREADY_MINIMAL, list(fr.retained), fr, k)

    total_fully_rows = sum(p.row_count for p in fully)
    if total_fully_rows >= k:
        # Minimal number of fully-matching partitions covering k rows:
        # biggest-first greedy is optimal for a count-coverage objective.
        chosen: List = []
        covered = 0
        for p in fully:
            if covered >= k:
                break
            chosen.append(p)
            covered += p.row_count
        cat = PRUNED_TO_1 if len(chosen) <= 1 else PRUNED_TO_GT1
        return LimitPruneOutcome(cat, chosen, fr, k)

    return LimitPruneOutcome(NO_FULLY_MATCHING, fully + partial, fr, k)
