"""Tests for scan-set filter pruning (§3) and partition classification."""
import datetime as dt

from repro.core.expr import and_, col, like
from repro.core.filter_pruning import (
    FULLY_MATCHING,
    NOT_MATCHING,
    PARTIALLY_MATCHING,
    classify_partition,
    prune_scan_set,
)
from .helpers import meta, ps


def fig5_partitions():
    """The four micro-partitions of Fig. 5 (metadata as printed)."""
    return [
        meta(1, 3, species=("Deer", "Squirrel"), s=(40, 170)),
        meta(2, 3, species=("Alpine Ibex", "Duck"), s=(23, 100)),
        meta(3, 4, species=("Alpine Chamois", "Alpine Marmot"), s=(58, 97)),
        meta(4, 3, species=("Alpine Ibex", "Squirrel"), s=(15, 60)),
    ]


FIG5_PRED = and_(like(col("species"), "Alpine%"), col("s") >= 50)


class TestFig5:
    """§4.1/§4.2 worked example: partition 1 pruned, 3 fully-matching."""

    def test_partition1_pruned(self):
        parts = fig5_partitions()
        assert classify_partition(FIG5_PRED, parts[0].stats) == NOT_MATCHING

    def test_partition3_fully_matching(self):
        parts = fig5_partitions()
        assert classify_partition(FIG5_PRED, parts[2].stats) == FULLY_MATCHING

    def test_partitions_2_and_4_partial(self):
        parts = fig5_partitions()
        # Partition 2 metadata spans Alpine..Duck -> may contain matches.
        assert (
            classify_partition(FIG5_PRED, parts[1].stats)
            == PARTIALLY_MATCHING
        )
        assert (
            classify_partition(FIG5_PRED, parts[3].stats)
            == PARTIALLY_MATCHING
        )

    def test_scan_set(self):
        r = prune_scan_set(fig5_partitions(), FIG5_PRED)
        assert [p.pid for p in r.pruned] == [1]
        assert [p.pid for p in r.retained] == [2, 3, 4]
        assert [p.pid for p in r.fully_matching] == [3]
        assert r.pruning_ratio == 0.25


class TestPruneScanSet:
    def test_no_predicate_keeps_all_as_fully(self):
        parts = [meta(i, 10, x=(i * 10, i * 10 + 9)) for i in range(5)]
        r = prune_scan_set(parts, None)
        assert len(r.retained) == 5
        assert len(r.fully_matching) == 5
        assert r.pruning_ratio == 0.0

    def test_range_pruning(self):
        parts = [meta(i, 10, x=(i * 10, i * 10 + 9)) for i in range(10)]
        r = prune_scan_set(parts, col("x") >= 75)
        assert [p.pid for p in r.retained] == [7, 8, 9]
        # Partitions 8 and 9 lie entirely >= 75.
        assert [p.pid for p in r.fully_matching] == [8, 9]
        assert r.pruning_ratio == 0.7

    def test_empty_partitions_always_pruned(self):
        parts = [meta(0, 0, x=(None, None, 0)), meta(1, 5, x=(0, 9))]
        r = prune_scan_set(parts, None)
        assert [p.pid for p in r.retained] == [1]

    def test_empty_scan_set(self):
        r = prune_scan_set([], col("x") > 1)
        assert r.n_total == 0 and r.pruning_ratio == 0.0

    def test_whole_scan_set_eliminated(self):
        # §3.3: filter pruning can remove the whole scan set (sub-tree
        # elimination opportunity).
        parts = [meta(i, 10, x=(0, 50)) for i in range(4)]
        r = prune_scan_set(parts, col("x") > 99)
        assert not r.retained and r.pruning_ratio == 1.0

    def test_wide_minmax_prunes_nothing(self):
        # §3.3's second failure mode: poorly distributed data.
        parts = [meta(i, 10, x=(0, 1000)) for i in range(4)]
        r = prune_scan_set(parts, col("x") > 500)
        assert len(r.retained) == 4 and r.pruning_ratio == 0.0

    def test_date_clustered_pruning(self):
        d0 = dt.date(2024, 1, 1)
        parts = [
            meta(
                i,
                100,
                ts=(d0 + dt.timedelta(days=10 * i), d0 + dt.timedelta(days=10 * i + 9)),
            )
            for i in range(10)
        ]
        r = prune_scan_set(parts, col("ts") >= d0 + dt.timedelta(days=85))
        assert [p.pid for p in r.retained] == [8, 9]
        assert [p.pid for p in r.fully_matching] == [9]

    def test_classifications_recorded(self):
        parts = fig5_partitions()
        r = prune_scan_set(parts, FIG5_PRED)
        assert r.classifications[1] == NOT_MATCHING
        assert r.classifications[3] == FULLY_MATCHING
