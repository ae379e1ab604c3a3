"""Tests for deriving min/max ranges of value expressions (§3.1)."""
import datetime as dt

import pytest

from repro.core.expr import Col, Lit, bounds, col, if_, lit
from repro.core.intervals import TOP, Interval
from .helpers import ps


class TestColBounds:
    def test_simple_column(self):
        b = bounds(col("x"), ps(10, x=(1, 9)))
        assert b.interval == Interval(1, 9)
        assert not b.may_null and not b.all_null

    def test_column_with_nulls(self):
        b = bounds(col("x"), ps(10, x=(1, 9, 3)))
        assert b.interval == Interval(1, 9)
        assert b.may_null and not b.all_null

    def test_all_null_column(self):
        b = bounds(col("x"), ps(10, x=(None, None, 10)))
        assert b.all_null

    def test_unknown_column(self):
        b = bounds(col("zz"), ps(10, x=(1, 9)))
        assert b.interval == TOP and b.may_null


class TestLitBounds:
    def test_literal(self):
        b = bounds(lit(42), ps(1))
        assert b.interval.is_point and b.interval.lo == 42
        assert not b.may_null

    def test_null_literal(self):
        b = bounds(lit(None), ps(1))
        assert b.all_null


class TestArithBounds:
    def test_scale(self):
        b = bounds(col("x") * 0.5, ps(5, x=(10, 20)))
        assert b.interval == Interval(5.0, 10.0)

    def test_add_columns(self):
        b = bounds(col("x") + col("y"), ps(5, x=(1, 2), y=(10, 20)))
        assert b.interval == Interval(11, 22)

    def test_sub(self):
        b = bounds(col("x") - 5, ps(5, x=(10, 20)))
        assert b.interval == Interval(5, 15)

    def test_div(self):
        b = bounds(col("x") / 2, ps(5, x=(10, 20)))
        assert b.interval == Interval(5.0, 10.0)

    def test_null_propagates(self):
        b = bounds(col("x") + col("y"), ps(5, x=(1, 2, 1), y=(10, 20)))
        assert b.may_null

    def test_incompatible_types_degrade_to_top(self):
        b = bounds(col("s") + 1, ps(5, s=("a", "z")))
        assert b.interval == TOP


class TestIfBounds:
    def test_paper_trails_expression(self):
        """§3.1: IF(unit='feet', altit*0.3048, altit) over the example
        metadata must yield (min≈284.68, max=7674)."""
        stats = ps(100, unit=("feet", "meters"), altit=(934, 7674))
        e = if_(col("unit").eq("feet"), col("altit") * 0.3048, col("altit"))
        b = bounds(e, stats)
        assert b.interval.lo == pytest.approx(284.6832)
        assert b.interval.hi == 7674

    def test_cond_always_true_narrows_to_then(self):
        """§3.1: when metadata proves all values equal 'feet', only the
        scaled branch range applies."""
        stats = ps(100, unit=("feet", "feet"), altit=(934, 7674))
        e = if_(col("unit").eq("feet"), col("altit") * 0.3048, col("altit"))
        b = bounds(e, stats)
        assert b.interval.lo == pytest.approx(284.6832)
        assert b.interval.hi == pytest.approx(2339.0352)

    def test_cond_always_false_narrows_to_else(self):
        stats = ps(100, unit=("meters", "meters"), altit=(934, 7674))
        e = if_(col("unit").eq("feet"), col("altit") * 0.3048, col("altit"))
        assert bounds(e, stats).interval == Interval(934, 7674)

    def test_null_cond_takes_else_branch(self):
        stats = ps(10, c=(None, None, 10), x=(1, 2), y=(100, 200))
        e = if_(col("c") > 0, col("x"), col("y"))
        assert bounds(e, stats).interval == Interval(100, 200)

    def test_not_value_expression_raises(self):
        with pytest.raises(TypeError):
            bounds(col("x") > 1, ps(1, x=(0, 2)))
