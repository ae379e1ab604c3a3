"""Micro-partitioned table store over the local filesystem.

The substrate standing in for Snowflake's storage layer + metadata
service (or an Iceberg manifest over Parquet files): a *lake table* is a
directory of Parquet files — one file per micro-partition — plus a JSON
manifest holding per-partition, per-column min/max/null statistics.
"""
from .manifest import Manifest, PartitionMeta
from .table import LakeTable

__all__ = ["Manifest", "PartitionMeta", "LakeTable"]
