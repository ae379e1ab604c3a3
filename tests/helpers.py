"""Shared test utilities.

``ps``/``meta`` build partition metadata by hand for metadata-only
tests; ``partition_pandas`` micro-partitions a pandas frame purely in
Python (stats computed with pandas) so pruning soundness can be
property-tested against brute-force row evaluation without Spark.
"""
from __future__ import annotations

import datetime as dt
from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd

from repro.core.expr import Expr, to_pandas_mask
from repro.core.filter_pruning import (
    FULLY_MATCHING,
    NOT_MATCHING,
    PARTIALLY_MATCHING,
)
from repro.core.stats import ColStats, PartitionStats
from repro.lake.manifest import PartitionMeta


def ps(rows: int, **cols) -> PartitionStats:
    """PartitionStats from kwargs: name=(min, max) or (min, max, nulls)."""
    out = {}
    for name, spec in cols.items():
        if len(spec) == 2:
            lo, hi = spec
            nulls = 0
        else:
            lo, hi, nulls = spec
        out[name] = ColStats(min=lo, max=hi, null_count=nulls)
    return PartitionStats(row_count=rows, columns=out)


def meta(pid: int, rows: int, **cols) -> PartitionMeta:
    """PartitionMeta with a dummy path for metadata-only tests."""
    return PartitionMeta(pid=pid, path=f"mem://{pid}", stats=ps(rows, **cols))


def _col_stats_from_series(s: pd.Series) -> ColStats:
    nn = s.dropna()
    if len(nn) == 0:
        return ColStats(min=None, max=None, null_count=int(s.isna().sum()))
    mn, mx = nn.min(), nn.max()
    if isinstance(mn, pd.Timestamp):
        mn, mx = mn.to_pydatetime(), mx.to_pydatetime()
    if hasattr(mn, "item"):
        mn = mn.item()
    if hasattr(mx, "item"):
        mx = mx.item()
    return ColStats(min=mn, max=mx, null_count=int(s.isna().sum()))


def partition_pandas(
    pdf: pd.DataFrame,
    n_parts: int,
    cluster_by: Optional[str] = None,
    seed: int = 0,
) -> Tuple[List[PartitionMeta], Dict[int, pd.DataFrame]]:
    """Split a frame into micro-partitions + metadata, all in pandas.

    Returns (metas, frames) where ``frames[pid]`` is the partition's
    data — use ``frames.__getitem__`` keyed by ``meta.pid`` as a reader.
    """
    if cluster_by is not None:
        pdf = pdf.sort_values(cluster_by, kind="stable")
    else:
        pdf = pdf.sample(frac=1.0, random_state=seed)
    chunks = np.array_split(np.arange(len(pdf)), n_parts)
    metas: List[PartitionMeta] = []
    frames: Dict[int, pd.DataFrame] = {}
    for pid, idx in enumerate(chunks):
        part = pdf.iloc[idx].reset_index(drop=True)
        stats = PartitionStats(
            row_count=len(part),
            columns={c: _col_stats_from_series(part[c]) for c in part.columns},
        )
        metas.append(PartitionMeta(pid=pid, path=f"mem://{pid}", stats=stats))
        frames[pid] = part
    return metas, frames


def reader_for(frames: Dict[int, pd.DataFrame]):
    return lambda m: frames[m.pid]


def brute_classify(pred: Optional[Expr], pdf: pd.DataFrame) -> str:
    """Ground-truth partition classification by evaluating every row."""
    if len(pdf) == 0:
        return NOT_MATCHING
    if pred is None:
        return FULLY_MATCHING
    m = to_pandas_mask(pred, pdf)
    if not m.any():
        return NOT_MATCHING
    if m.all():
        return FULLY_MATCHING
    return PARTIALLY_MATCHING


def brute_topk_values(
    pdf: pd.DataFrame,
    order_col: str,
    k: int,
    pred: Optional[Expr] = None,
    desc: bool = True,
) -> List:
    """Ground-truth top-k order-value multiset over a full frame."""
    if pred is not None:
        pdf = pdf[to_pandas_mask(pred, pdf)]
    vals = pdf[order_col].dropna()
    return vals.sort_values(ascending=not desc).head(k).tolist()
