"""Tests for the lake substrate: writer, manifest, reader round-trips."""
import datetime as dt
import json

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.stats import ColStats
from repro.lake import LakeTable, Manifest
from repro.lake.manifest import PartitionMeta
from repro.core.stats import PartitionStats


@pytest.fixture(scope="module")
def small_table(spark, tmp_path_factory):
    pdf = pd.DataFrame(
        {
            "id": range(1, 1001),
            "val": [i * 0.5 for i in range(1000)],
            "name": [f"row{i:04d}" for i in range(1000)],
            "d": pd.to_datetime("2024-01-01")
            + pd.to_timedelta([i % 100 for i in range(1000)], unit="D"),
        }
    )
    df = spark.createDataFrame(pdf).withColumn("d", F.to_date("d"))
    path = tmp_path_factory.mktemp("lake") / "t"
    return LakeTable.write(df, path, n_partitions=8, cluster_by=["id"])


class TestWriter:
    def test_partition_count(self, small_table):
        assert small_table.manifest.n_partitions == 8

    def test_total_rows_preserved(self, small_table):
        assert small_table.manifest.total_rows == 1000

    def test_clustered_ranges_disjoint(self, small_table):
        parts = sorted(
            small_table.manifest.partitions,
            key=lambda p: p.stats.col("id").min,
        )
        for a, b in zip(parts, parts[1:]):
            assert a.stats.col("id").max < b.stats.col("id").min

    def test_stats_cover_all_columns(self, small_table):
        for p in small_table.manifest.partitions:
            assert set(p.stats.columns) == {"id", "val", "name", "d"}

    def test_date_stats_are_dates(self, small_table):
        cs = small_table.manifest.partitions[0].stats.col("d")
        assert isinstance(cs.min, dt.date)

    def test_column_types_recorded(self, small_table):
        ct = small_table.manifest.column_types
        assert ct == {"id": "int", "val": "float", "name": "str", "d": "date"}

    def test_random_layout_wide_ranges(self, spark, tmp_path):
        pdf = pd.DataFrame({"x": range(1000)})
        t = LakeTable.write(
            spark.createDataFrame(pdf), tmp_path / "r",
            n_partitions=4, cluster_by=None,
        )
        # Every random partition should span most of the domain.
        for p in t.manifest.partitions:
            cs = p.stats.col("x")
            assert cs.max - cs.min > 500

    def test_null_counts(self, spark, tmp_path):
        pdf = pd.DataFrame({"x": [1.0, None, 3.0, None, 5.0] * 20})
        t = LakeTable.write(
            spark.createDataFrame(pdf), tmp_path / "n", n_partitions=2
        )
        total_nulls = sum(
            p.stats.col("x").null_count for p in t.manifest.partitions
        )
        assert total_nulls == 40


class TestManifestPersistence:
    def test_round_trip(self, small_table):
        loaded = LakeTable.load(small_table.path)
        assert loaded.manifest.to_json() == small_table.manifest.to_json()

    def test_json_dates_tagged(self, small_table):
        j = json.dumps(small_table.manifest.to_json())
        assert "$date" in j

    def test_manifest_from_json_types(self, small_table):
        m = Manifest.from_json(small_table.manifest.to_json())
        cs = m.partitions[0].stats.col("d")
        assert isinstance(cs.min, dt.date)


class TestReader:
    def test_full_scan_row_count(self, spark, small_table):
        assert small_table.full(spark).count() == 1000

    def test_scan_subset(self, spark, small_table):
        parts = small_table.manifest.partitions[:2]
        n = sum(p.row_count for p in parts)
        assert small_table.scan(spark, parts).count() == n

    def test_empty_scan_set(self, spark, small_table):
        df = small_table.scan(spark, [])
        assert df.count() == 0
        assert set(df.columns) == {"id", "val", "name", "d"}

    def test_read_partition_pandas(self, small_table):
        p = small_table.manifest.partitions[0]
        pdf = small_table.read_partition_pandas(p)
        assert len(pdf) == p.row_count
        assert pdf["id"].min() == p.stats.col("id").min
        assert pdf["id"].max() == p.stats.col("id").max

    def test_pandas_dates_are_datetime64(self, small_table):
        pdf = small_table.read_partition_pandas(
            small_table.manifest.partitions[0]
        )
        assert pd.api.types.is_datetime64_any_dtype(pdf["d"])

    def test_to_pandas_whole_table(self, small_table):
        pdf = small_table.to_pandas()
        assert len(pdf) == 1000
        assert sorted(pdf["id"]) == list(range(1, 1001))

    def test_scan_matches_pandas_read(self, spark, small_table):
        p = small_table.manifest.partitions[3]
        via_spark = small_table.scan(spark, [p]).toPandas()
        via_arrow = small_table.read_partition_pandas(p)
        assert sorted(via_spark["id"]) == sorted(via_arrow["id"])


class TestStatsJsonEdgeCases:
    def test_all_null_stats_roundtrip(self):
        m = Manifest(
            name="x", schema_json="{}", column_types={"a": "float"},
            partitions=[
                PartitionMeta(
                    pid=0, path="p",
                    stats=PartitionStats(
                        row_count=5,
                        columns={"a": ColStats(None, None, 5)},
                    ),
                )
            ],
        )
        m2 = Manifest.from_json(m.to_json())
        assert m2.partitions[0].stats.col("a").all_null
