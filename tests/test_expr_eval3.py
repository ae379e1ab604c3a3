"""Tests for tri-state partition evaluation — the pruning decision core.

NEVER ('T' impossible) drives filter pruning (§3); ALWAYS (outcome set
exactly {'T'}) identifies fully-matching partitions (§4.2).
"""
import datetime as dt

import pytest

from repro.core.expr import (
    T_ONLY,
    always_match,
    and_,
    between,
    can_match,
    col,
    eval3,
    if_,
    isin,
    isnull,
    like,
    lit,
    not_,
    or_,
    startswith,
)
from .helpers import ps


def outcomes(pred, stats):
    return "".join(sorted(eval3(pred, stats)))


class TestComparisons:
    def test_gt_never(self):
        # Paper §2.1: partition 0..9 pruned for x >= 15.
        assert outcomes(col("x") >= 15, ps(10, x=(0, 9))) == "F"

    def test_gt_maybe(self):
        # Partition 10..19 must be processed for x >= 15.
        assert outcomes(col("x") >= 15, ps(10, x=(10, 19))) == "FT"

    def test_gt_always(self):
        assert outcomes(col("x") >= 15, ps(10, x=(15, 19))) == "T"

    def test_lt(self):
        assert outcomes(col("x") < 5, ps(10, x=(5, 9))) == "F"
        assert outcomes(col("x") < 5, ps(10, x=(0, 4))) == "T"
        assert outcomes(col("x") < 5, ps(10, x=(0, 9))) == "FT"

    def test_le_boundary(self):
        assert outcomes(col("x") <= 5, ps(10, x=(5, 9))) == "FT"
        assert outcomes(col("x") <= 5, ps(10, x=(6, 9))) == "F"
        assert outcomes(col("x") <= 5, ps(10, x=(0, 5))) == "T"

    def test_eq(self):
        assert outcomes(col("x").eq(7), ps(10, x=(0, 5))) == "F"
        assert outcomes(col("x").eq(7), ps(10, x=(0, 9))) == "FT"
        assert outcomes(col("x").eq(7), ps(10, x=(7, 7))) == "T"

    def test_ne(self):
        assert outcomes(col("x").ne(7), ps(10, x=(7, 7))) == "F"
        assert outcomes(col("x").ne(7), ps(10, x=(0, 5))) == "T"
        assert outcomes(col("x").ne(7), ps(10, x=(0, 9))) == "FT"

    def test_col_vs_col(self):
        assert outcomes(col("x") < col("y"), ps(5, x=(0, 5), y=(10, 20))) == "T"
        assert outcomes(col("x") < col("y"), ps(5, x=(30, 40), y=(10, 20))) == "F"
        assert outcomes(col("x") < col("y"), ps(5, x=(0, 15), y=(10, 20))) == "FT"

    def test_dates(self):
        s = ps(5, d=(dt.date(2024, 1, 1), dt.date(2024, 3, 1)))
        assert outcomes(col("d") >= dt.date(2024, 4, 1), s) == "F"
        assert outcomes(col("d") >= dt.date(2024, 2, 1), s) == "FT"
        assert outcomes(col("d") >= dt.date(2023, 1, 1), s) == "T"

    def test_strings(self):
        s = ps(5, n=("Basecamp", "Unmarked"))
        assert outcomes(col("n") >= "Zebra", s) == "F"
        assert outcomes(col("n") >= "Marked", s) == "FT"


class TestNullHandling:
    def test_nulls_downgrade_always(self):
        # A null row fails the filter, so ALWAYS cannot be claimed.
        assert outcomes(col("x") >= 0, ps(10, x=(0, 9, 2))) == "NT"

    def test_nulls_keep_never(self):
        assert outcomes(col("x") >= 15, ps(10, x=(0, 9, 2))) == "FN"

    def test_all_null_is_never_true(self):
        o = eval3(col("x") > 0, ps(10, x=(None, None, 10)))
        assert not can_match(o)

    def test_arith_null_propagation(self):
        assert "N" in eval3(col("x") + col("y") > 0, ps(5, x=(1, 2, 1), y=(1, 2)))

    def test_isnull(self):
        assert outcomes(isnull(col("x")), ps(10, x=(0, 9, 2))) == "FT"
        assert outcomes(isnull(col("x")), ps(10, x=(0, 9))) == "F"
        assert outcomes(isnull(col("x")), ps(10, x=(None, None, 10))) == "T"

    def test_not_isnull(self):
        assert outcomes(not_(isnull(col("x"))), ps(10, x=(0, 9))) == "T"


class TestBooleanComposition:
    def test_and_never_dominates(self):
        p = and_(col("x") > 100, col("y") > 0)
        assert outcomes(p, ps(5, x=(0, 5), y=(1, 2))) == "F"

    def test_and_always(self):
        p = and_(col("x") > 0, col("y") > 0)
        assert outcomes(p, ps(5, x=(1, 5), y=(1, 2))) == "T"

    def test_and_maybe(self):
        p = and_(col("x") > 3, col("y") > 0)
        assert outcomes(p, ps(5, x=(0, 5), y=(1, 2))) == "FT"

    def test_or_always_dominates(self):
        p = or_(col("x") > 100, col("y") > 0)
        assert outcomes(p, ps(5, x=(0, 5), y=(1, 2))) == "T"

    def test_or_never(self):
        p = or_(col("x") > 100, col("y") > 100)
        assert outcomes(p, ps(5, x=(0, 5), y=(1, 2))) == "F"

    def test_not_flips(self):
        assert outcomes(not_(col("x") > 100), ps(5, x=(0, 5))) == "T"
        assert outcomes(not_(col("x") > -1), ps(5, x=(0, 5))) == "F"

    def test_not_with_nulls_is_not_always(self):
        # NOT(x > 100) on a partition with nulls: null rows stay null.
        o = eval3(not_(col("x") > 100), ps(5, x=(0, 5, 1)))
        assert not always_match(o) and can_match(o)

    def test_between(self):
        assert outcomes(between(col("x"), 3, 7), ps(5, x=(4, 6))) == "T"
        assert outcomes(between(col("x"), 3, 7), ps(5, x=(8, 9))) == "F"

    def test_boolean_literal_true(self):
        assert outcomes(lit(True), ps(5)) == "T"
        assert outcomes(lit(False), ps(5)) == "F"


class TestLikeAndStartsWith:
    def test_pure_prefix_fully_matching(self):
        # Fig. 5 partition 3: min/max both start with 'Alpine'.
        s = ps(4, species=("Alpine Chamois", "Alpine Marmot"))
        assert outcomes(like(col("species"), "Alpine%"), s) == "T"

    def test_pure_prefix_pruned(self):
        s = ps(3, species=("Deer", "Squirrel"))
        assert outcomes(like(col("species"), "Alpine%"), s) == "F"

    def test_pure_prefix_maybe(self):
        s = ps(5, species=("Alpine Ibex", "Bear"))
        assert outcomes(like(col("species"), "Alpine%"), s) == "FT"

    def test_imprecise_rewrite_never_claims_always(self):
        # §3.1: 'Marked-%-Ridge' is widened to STARTSWITH('Marked-');
        # the widened check may keep the partition but cannot prove ALL.
        s = ps(5, name=("Marked-A-Ridge", "Marked-Z-Ridge"))
        o = eval3(like(col("name"), "Marked-%-Ridge"), s)
        assert can_match(o) and not always_match(o)

    def test_imprecise_rewrite_prunes(self):
        s = ps(5, name=("Basecamp", "Creek"))
        assert outcomes(like(col("name"), "Marked-%-Ridge"), s) == "F"

    def test_paper_trails_metadata_not_pruned(self):
        s = ps(5, name=("Basecamp", "Unmarked"))
        o = eval3(like(col("name"), "Marked-%-Ridge"), s)
        assert can_match(o)

    def test_like_no_wildcards_is_equality(self):
        s = ps(5, name=("Bob", "Bob"))
        assert outcomes(like(col("name"), "Bob"), s) == "T"
        assert outcomes(like(col("name"), "Eve"), s) == "F"

    def test_like_no_prefix_cannot_prune(self):
        s = ps(5, name=("A", "B"))
        o = eval3(like(col("name"), "%x"), s)
        assert can_match(o) and not always_match(o)

    def test_startswith(self):
        s = ps(4, species=("Alpine Chamois", "Alpine Marmot"))
        assert outcomes(startswith(col("species"), "Alpine"), s) == "T"
        assert outcomes(startswith(col("species"), "Zeb"), s) == "F"

    def test_like_null_column(self):
        s = ps(5, name=(None, None, 5))
        assert not can_match(eval3(like(col("name"), "A%"), s))


class TestInList:
    def test_in_hit(self):
        assert outcomes(isin(col("x"), [3, 7]), ps(5, x=(0, 5))) == "FT"

    def test_in_miss(self):
        assert outcomes(isin(col("x"), [10, 20]), ps(5, x=(0, 5))) == "F"

    def test_in_point_always(self):
        assert outcomes(isin(col("x"), [4, 9]), ps(5, x=(4, 4))) == "T"


class TestPaperTrailsQuery:
    """The full §3.1 pruning scenario."""

    PRED = and_(
        if_(col("unit").eq("feet"), col("altit") * 0.3048, col("altit")) > 1500,
        like(col("name"), "Marked-%-Ridge"),
    )

    def test_example_partition_retained(self):
        s = ps(
            100,
            unit=("feet", "meters"),
            altit=(934, 7674),
            name=("Basecamp", "Unmarked"),
        )
        assert can_match(eval3(self.PRED, s))

    def test_all_feet_low_altitude_pruned(self):
        # All rows in feet and even the max altitude converts below 1500.
        s = ps(
            100,
            unit=("feet", "feet"),
            altit=(934, 4000),
            name=("Basecamp", "Unmarked"),
        )
        assert not can_match(eval3(self.PRED, s))

    def test_name_range_prunes(self):
        s = ps(
            100,
            unit=("feet", "meters"),
            altit=(934, 7674),
            name=("Nest", "Zebra"),
        )
        assert not can_match(eval3(self.PRED, s))


class TestUnknownMetadata:
    def test_unknown_column_cannot_prune(self):
        o = eval3(col("nope") > 5, ps(10, x=(0, 9)))
        assert can_match(o) and not always_match(o)

    def test_mixed_types_cannot_prune(self):
        o = eval3(col("x") > "abc", ps(10, x=(0, 9)))
        assert can_match(o)
