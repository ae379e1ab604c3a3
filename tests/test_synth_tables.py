"""Tests for provided synth_data generators + production-like tables."""
import datetime as dt

import pytest

from repro import synth_data
from repro.workload.tables import EVENT_EPOCH


class TestProvidedGenerators:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        assert a.equals(b)

    def test_lineitem_row_count(self, spark):
        assert synth_data.lineitem(spark, sf=0.001).count() == 6000

    def test_orders_keys_sequential(self, spark):
        pdf = synth_data.orders(spark, sf=0.001).toPandas()
        assert sorted(pdf["o_orderkey"]) == list(range(1, 1501))

    def test_zipf_keys_skewed(self, spark):
        pdf = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        pdf = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert pdf["k"].between(1, 50).all()


class TestProductionLake:
    def test_tables_present(self, prod_lake):
        assert set(prod_lake) == {
            "events", "users", "incidents", "blob", "tiny"
        }

    def test_events_clustered_by_ts(self, prod_lake):
        parts = sorted(
            prod_lake["events"].manifest.partitions,
            key=lambda p: p.stats.col("ts").min,
        )
        for a, b in zip(parts, parts[1:]):
            assert a.stats.col("ts").max <= b.stats.col("ts").min

    def test_event_id_correlates_with_ts(self, prod_lake):
        """Sequence ids must track time so they cluster too."""
        parts = sorted(
            prod_lake["events"].manifest.partitions,
            key=lambda p: p.stats.col("ts").min,
        )
        id_ranges = [
            (p.stats.col("event_id").min, p.stats.col("event_id").max)
            for p in parts
        ]
        overlaps = sum(
            1 for a, b in zip(id_ranges, id_ranges[1:]) if a[1] > b[0]
        )
        assert overlaps == 0

    def test_incidents_keys_in_recent_block(self, prod_lake):
        n_events = prod_lake["events"].manifest.total_rows
        for p in prod_lake["incidents"].manifest.partitions:
            cs = p.stats.col("event_id")
            assert cs.min >= int(n_events * 0.9)

    def test_tiny_single_partition(self, prod_lake):
        assert prod_lake["tiny"].manifest.n_partitions == 1

    def test_blob_unclustered(self, prod_lake):
        for p in prod_lake["blob"].manifest.partitions:
            cs = p.stats.col("k")
            span = cs.max - cs.min
            assert span > prod_lake["blob"].manifest.total_rows * 0.5

    def test_events_dates_in_domain(self, prod_lake):
        for p in prod_lake["events"].manifest.partitions:
            cs = p.stats.col("ts")
            assert cs.min >= EVENT_EPOCH
            assert cs.max <= EVENT_EPOCH + dt.timedelta(days=500)
