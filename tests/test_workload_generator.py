"""Tests for the workload generator: determinism, mix frequencies,
k-distribution, and SQL renderability."""
import datetime as dt
from collections import Counter

import duckdb
import numpy as np
import pytest

from repro.core import query as q
from repro.core.expr import to_sql
from repro.workload.generator import (
    K_PROBS,
    K_VALUES,
    LakeShape,
    WorkloadGenerator,
    WorkloadProfile,
)


@pytest.fixture()
def shape():
    return LakeShape(
        ts_min=dt.date(2024, 1, 1),
        ts_max=dt.date(2025, 2, 1),
        n_events=10_000,
        n_users=1_000,
    )


class TestProfile:
    def test_k_distribution_sums_to_one(self):
        assert abs(sum(K_PROBS) - 1.0) < 1e-9
        assert len(K_PROBS) == len(K_VALUES)

    def test_fig6_small_k_dominates(self):
        # Fig. 6: 97 % of LIMIT queries have k <= 10 000.
        mass_small = sum(
            p for v, p in zip(K_VALUES, K_PROBS) if v <= 10_000
        )
        assert mass_small == pytest.approx(0.97, abs=0.01)

    def test_remaining_mass_positive(self):
        assert WorkloadProfile().p_select_filter > 0.4

    def test_table1_frequencies_encoded(self):
        p = WorkloadProfile()
        assert p.p_limit_no_pred == pytest.approx(0.0037)
        assert p.p_limit_pred == pytest.approx(0.0223)
        assert p.p_topk == pytest.approx(0.0447)
        assert p.p_topk_group_key == pytest.approx(0.0012)
        assert p.p_topk_group_agg == pytest.approx(0.0096)


class TestDeterminism:
    def test_same_seed_same_workload(self, shape):
        a = WorkloadGenerator(shape, seed=3).generate(50)
        b = WorkloadGenerator(shape, seed=3).generate(50)
        assert [s.to_sql() for s in a] == [s.to_sql() for s in b]

    def test_different_seed_differs(self, shape):
        a = WorkloadGenerator(shape, seed=3).generate(50)
        b = WorkloadGenerator(shape, seed=4).generate(50)
        assert [s.to_sql() for s in a] != [s.to_sql() for s in b]


class TestMix:
    def test_qtype_frequencies_close_to_table1(self, shape):
        gen = WorkloadGenerator(shape, seed=0)
        n = 20_000
        counts = Counter(s.qtype for s in gen.generate(n))
        assert counts[q.LIMIT] / n == pytest.approx(0.026, abs=0.005)
        topk_total = (
            counts[q.TOPK] + counts[q.TOPK_GROUP_KEY] + counts[q.TOPK_GROUP_AGG]
        )
        assert topk_total / n == pytest.approx(0.0555, abs=0.006)

    def test_limit_workload_pred_ratio(self, shape):
        gen = WorkloadGenerator(shape, seed=1)
        specs = gen.generate_limit_workload(2_000)
        with_pred = sum(1 for s in specs if s.pred is not None)
        # Table 1: 2.23 / 2.60 of LIMIT queries carry a predicate.
        assert with_pred / len(specs) == pytest.approx(0.858, abs=0.04)

    def test_topk_workload_all_topk(self, shape):
        specs = WorkloadGenerator(shape, seed=2).generate_topk_workload(100)
        assert all(s.qtype == q.TOPK for s in specs)
        assert all(s.k >= 1 for s in specs)


class TestSpecValidity:
    def test_sql_renders_and_parses(self, shape):
        gen = WorkloadGenerator(shape, seed=5)
        con = duckdb.connect()
        try:
            con.execute("CREATE TABLE events(event_id BIGINT, ts DATE, "
                        "user_id BIGINT, etype TEXT, amount DOUBLE, "
                        "duration BIGINT, country TEXT)")
            con.execute("CREATE TABLE users(user_id BIGINT, signup_day BIGINT,"
                        " country TEXT, score DOUBLE)")
            con.execute("CREATE TABLE blob(k BIGINT, v DOUBLE, cat TEXT, "
                        "score DOUBLE)")
            con.execute("CREATE TABLE incidents(event_id BIGINT, "
                        "severity BIGINT, assignee TEXT)")
            con.execute("CREATE TABLE tiny(status_id BIGINT, label TEXT, "
                        "weight DOUBLE)")
            for s in gen.generate(200):
                con.execute(s.to_sql())  # empty tables: must still parse
        finally:
            con.close()

    def test_topk_specs_have_plan_ops(self, shape):
        gen = WorkloadGenerator(shape, seed=6)
        for _ in range(30):
            s = gen.sample("topk_group_agg")
            assert s.plan_ops and s.plan_ops[0].kind == "groupby"

    def test_limit_pred_specs_mark_shape(self, shape):
        gen = WorkloadGenerator(
            shape,
            profile=WorkloadProfile(p_limit_shape_unsupported=1.0),
            seed=7,
        )
        s = gen.sample("limit_pred")
        assert not s.limit_shape_supported

    def test_k_sampler_respects_min(self, shape):
        gen = WorkloadGenerator(shape, seed=8)
        assert all(gen.sample_k(min_k=1) >= 1 for _ in range(200))


class TestLakeShape:
    def test_from_tables_reads_manifest(self):
        """LakeShape derives ts bounds from partition stats."""
        from .helpers import meta

        class FakeTable:
            def __init__(self, parts, rows):
                from repro.lake.manifest import Manifest

                self.manifest = Manifest(
                    name="x", schema_json="{}", column_types={},
                    partitions=parts,
                )

        ev = [
            meta(0, 10, ts=(dt.date(2024, 1, 1), dt.date(2024, 2, 1))),
            meta(1, 10, ts=(dt.date(2024, 2, 2), dt.date(2024, 3, 1))),
        ]
        us = [meta(0, 55, user_id=(1, 55))]
        shape = LakeShape.from_tables(
            {"events": FakeTable(ev, 20), "users": FakeTable(us, 55)}
        )
        assert shape.ts_min == dt.date(2024, 1, 1)
        assert shape.ts_max == dt.date(2024, 3, 1)
        assert shape.n_events == 20 and shape.n_users == 55
