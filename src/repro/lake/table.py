"""Lake table: write/read micro-partitioned Parquet + manifest.

Writing uses the Spark DataFrame API end-to-end:

* clustered layout  — ``repartitionByRange(n, *cluster_by)`` models a
  table maintained under a clustering key (each output file covers a
  narrow value range, like Snowflake's clustered micro-partitions);
* random layout     — range-partition by a seeded ``rand()`` column,
  modelling arrival-order ingestion with no useful value locality.

The manifest is then derived with a single Spark aggregation grouped by
``input_file_name()`` computing per-file min/max/null-count/row-count —
the moral equivalent of the metadata-backfill scan described in §8.1.
"""
from __future__ import annotations

import datetime as _dt
from pathlib import Path
from typing import Iterable, List, Optional, Sequence
from urllib.parse import unquote, urlparse

import pandas as pd
import pyarrow.parquet as pq
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.stats import ColStats, PartitionStats
from .manifest import Manifest, PartitionMeta

_TYPE_TAGS = {
    T.ByteType: "int",
    T.ShortType: "int",
    T.IntegerType: "int",
    T.LongType: "int",
    T.FloatType: "float",
    T.DoubleType: "float",
    T.StringType: "str",
    T.DateType: "date",
    T.TimestampType: "datetime",
    T.BooleanType: "bool",
}


def _type_tag(dt: T.DataType) -> str:
    for klass, tag in _TYPE_TAGS.items():
        if isinstance(dt, klass):
            return tag
    return "other"


def _local_path(file_uri: str) -> str:
    """``input_file_name()`` returns a URI; map it to a local FS path."""
    if file_uri.startswith("file:"):
        return unquote(urlparse(file_uri).path)
    return unquote(file_uri)


def _native(v):
    """Normalise a collected Spark value for JSON-able stats storage."""
    if v is None:
        return None
    if isinstance(v, (_dt.datetime, _dt.date, str, bool, int, float)):
        return v
    return v.item() if hasattr(v, "item") else v


class LakeTable:
    """A micro-partitioned table: data directory + in-memory manifest."""

    def __init__(self, path: str | Path, manifest: Manifest):
        self.path = Path(path)
        self.manifest = manifest

    # -- construction ------------------------------------------------------

    @staticmethod
    def write(
        df: DataFrame,
        path: str | Path,
        *,
        n_partitions: int,
        cluster_by: Optional[Sequence[str]] = None,
        name: Optional[str] = None,
        seed: int = 0,
    ) -> "LakeTable":
        """Partition ``df`` into ``n_partitions`` micro-partitions and
        persist data + manifest under ``path``.
        """
        path = Path(path)
        data_dir = str(path / "data")
        if cluster_by:
            dfw = df.repartitionByRange(n_partitions, *[F.col(c) for c in cluster_by])
        else:
            dfw = (
                df.withColumn("_shuffle", F.rand(seed))
                .repartitionByRange(n_partitions, F.col("_shuffle"))
                .drop("_shuffle")
            )
        dfw.write.mode("overwrite").parquet(data_dir)
        manifest = LakeTable._build_manifest(
            df.sparkSession, data_dir, df.schema, name or path.name
        )
        manifest.save(path / "manifest.json")
        return LakeTable(path, manifest)

    @staticmethod
    def _build_manifest(
        spark: SparkSession, data_dir: str, schema: T.StructType, name: str
    ) -> Manifest:
        df = spark.read.schema(schema).parquet(data_dir)
        cols = df.columns
        aggs = [F.count(F.lit(1)).alias("_rows")]
        for c in cols:
            aggs.append(F.min(c).alias(f"min__{c}"))
            aggs.append(F.max(c).alias(f"max__{c}"))
            aggs.append(F.sum(F.col(c).isNull().cast("long")).alias(f"nulls__{c}"))
        rows = (
            df.withColumn("_file", F.input_file_name())
            .groupBy("_file")
            .agg(*aggs)
            .collect()
        )
        rows.sort(key=lambda r: r["_file"])
        partitions: List[PartitionMeta] = []
        for pid, r in enumerate(rows):
            col_stats = {
                c: ColStats(
                    min=_native(r[f"min__{c}"]),
                    max=_native(r[f"max__{c}"]),
                    null_count=int(r[f"nulls__{c}"]),
                )
                for c in cols
            }
            partitions.append(
                PartitionMeta(
                    pid=pid,
                    path=_local_path(r["_file"]),
                    stats=PartitionStats(row_count=int(r["_rows"]), columns=col_stats),
                )
            )
        return Manifest(
            name=name,
            schema_json=schema.json(),
            column_types={f.name: _type_tag(f.dataType) for f in schema.fields},
            partitions=partitions,
        )

    @staticmethod
    def load(path: str | Path) -> "LakeTable":
        path = Path(path)
        return LakeTable(path, Manifest.load(path / "manifest.json"))

    # -- reading -----------------------------------------------------------

    @property
    def schema(self) -> T.StructType:
        return T.StructType.fromJson(__import__("json").loads(self.manifest.schema_json))

    def scan(
        self, spark: SparkSession, metas: Iterable[PartitionMeta]
    ) -> DataFrame:
        """Spark DataFrame over exactly the given scan set (empty-safe)."""
        paths = [m.path for m in metas]
        if not paths:
            return spark.createDataFrame([], self.schema)
        return spark.read.schema(self.schema).parquet(*paths)

    def full(self, spark: SparkSession) -> DataFrame:
        """Unpruned scan over every micro-partition."""
        return self.scan(spark, self.manifest.partitions)

    def read_partition_pandas(self, meta: PartitionMeta) -> pd.DataFrame:
        """Single-partition read on the simulated warehouse-worker path.

        Dates map to ``datetime64[ns]`` so pandas-mask predicate
        evaluation (`repro.core.expr.to_pandas_mask`) behaves like SQL.
        """
        return pq.read_table(meta.path).to_pandas(date_as_object=False)

    def to_pandas(self) -> pd.DataFrame:
        """Whole table as pandas (oracle inputs at test scale)."""
        frames = [self.read_partition_pandas(m) for m in self.manifest.partitions]
        if not frames:
            return pd.DataFrame(
                columns=[f.name for f in self.schema.fields]
            )
        return pd.concat(frames, ignore_index=True)
