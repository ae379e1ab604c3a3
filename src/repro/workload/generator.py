"""Synthetic query workload parameterized by the paper's published stats.

The private production workload is substituted by a deterministic
generator whose *marginals* come straight from the paper:

* query-type frequencies — Table 1 (LIMIT 0.37 %/2.23 %, top-k
  4.47 %/0.12 %/0.96 % of SELECT queries);
* LIMIT k distribution — Fig. 6 (heavily skewed to tiny k; 97 % ≤ 10 000);
* predicate selectivity — §8.3's observation that real-world predicates
  are far more selective than TPC-H's: most predicates are tight time
  windows or point lookups on clustered columns, with a minority of
  non-prunable predicates (the Fig. 4 zero-pruning population).

Every generated query is a :class:`repro.core.query.QuerySpec`; its SQL
text (``spec.to_sql()``) is what the Table 1 classifier consumes.
"""
from __future__ import annotations

import datetime as _dt
from dataclasses import dataclass
from typing import Dict, List, Optional

import numpy as np

from repro.core import query as q
from repro.core.expr import Expr, and_, between, col, isin, like
from repro.core.topk_pruning import PlanOp

# -- Fig. 6: the k distribution (values, probabilities) ---------------------
K_VALUES = [0, 1, 5, 10, 50, 100, 500, 1000, 5000, 10000, 100000, 2000000]
K_PROBS = [0.22, 0.28, 0.05, 0.12, 0.04, 0.10, 0.03, 0.06, 0.03, 0.04, 0.02, 0.01]


@dataclass
class WorkloadProfile:
    """Tunable mix parameters; defaults follow Table 1 / Fig. 6 / §8.3."""

    # Table 1 frequencies (fractions of all SELECT queries).
    p_limit_no_pred: float = 0.0037
    p_limit_pred: float = 0.0223
    p_topk: float = 0.0447
    p_topk_group_key: float = 0.0012
    p_topk_group_agg: float = 0.0096
    # Remaining mass split across plain/filtered/join selects.
    p_select_no_pred: float = 0.13
    p_join: float = 0.20
    # LIMIT-query composition, calibrated against Table 2's buckets:
    # share of no-predicate LIMIT queries that hit a single-partition
    # table (already-minimal), and for with-predicate LIMIT queries the
    # share with point (1-partition) predicates vs. range predicates,
    # plus the share of range-predicate queries whose plan shape blocks
    # pushdown (aggregations/joins above the scan, §4.3).
    p_limit_tiny_table: float = 0.80
    p_limit_point_pred: float = 0.60
    p_limit_shape_unsupported: float = 0.60
    # Probability a top-k query carries a predicate.
    p_topk_with_pred: float = 0.7

    @property
    def p_select_filter(self) -> float:
        used = (
            self.p_limit_no_pred
            + self.p_limit_pred
            + self.p_topk
            + self.p_topk_group_key
            + self.p_topk_group_agg
            + self.p_select_no_pred
            + self.p_join
        )
        return max(0.0, 1.0 - used)


@dataclass
class LakeShape:
    """Domain bounds the generator needs, derived from table manifests."""

    ts_min: _dt.date
    ts_max: _dt.date
    n_events: int
    n_users: int

    @classmethod
    def from_tables(cls, tables: Dict[str, object]) -> "LakeShape":
        ev = tables["events"].manifest
        ts_lo, ts_hi, n_ev = None, None, 0
        for p in ev.partitions:
            cs = p.stats.col("ts")
            n_ev += p.row_count
            if cs and cs.min is not None:
                ts_lo = cs.min if ts_lo is None else min(ts_lo, cs.min)
                ts_hi = cs.max if ts_hi is None else max(ts_hi, cs.max)
        return cls(
            ts_min=ts_lo,
            ts_max=ts_hi,
            n_events=n_ev,
            n_users=tables["users"].manifest.total_rows,
        )


class WorkloadGenerator:
    """Deterministic query-spec sampler over the production-like lake."""

    def __init__(
        self,
        shape: LakeShape,
        profile: Optional[WorkloadProfile] = None,
        seed: int = 0,
    ):
        self.shape = shape
        self.profile = profile or WorkloadProfile()
        self.rng = np.random.default_rng(seed)

    # -- k sampling --------------------------------------------------------

    def sample_k(self, *, min_k: int = 0) -> int:
        while True:
            k = int(self.rng.choice(K_VALUES, p=K_PROBS))
            if k >= min_k:
                return k

    # -- predicate templates ----------------------------------------------

    def _events_ts_window(self, *, wide: bool = False) -> Expr:
        """Recent-window predicate on the clustered date column."""
        span = (self.shape.ts_max - self.shape.ts_min).days
        w = int(self.rng.integers(3, 45)) if wide else int(self.rng.integers(1, 15))
        w = min(w, max(span, 1))
        lo = self.shape.ts_max - _dt.timedelta(days=w)
        return col("ts") >= lo

    def _events_ts_range(self) -> Expr:
        """Historical window — interior partitions become fully-matching."""
        span = (self.shape.ts_max - self.shape.ts_min).days
        w = int(self.rng.integers(10, 60))
        start = int(self.rng.integers(0, max(1, span - w)))
        lo = self.shape.ts_min + _dt.timedelta(days=start)
        hi = lo + _dt.timedelta(days=w)
        return between(col("ts"), lo, hi)

    def _events_point_day(self) -> Expr:
        """Single-day equality on the clustered date — prunes to ~1
        partition (the "already minimal after filter pruning" shape)."""
        span = (self.shape.ts_max - self.shape.ts_min).days
        d = self.shape.ts_min + _dt.timedelta(
            days=int(self.rng.integers(0, max(1, span)))
        )
        return col("ts").eq(d)

    def _events_pred(self, *, for_limit: bool = False) -> Expr:
        r = self.rng.random()
        if for_limit:
            # Mix of range predicates (often with fully-matching interior
            # partitions) and conjunctions with an unclustered column
            # (rarely any fully-matching partition).
            base = self._events_ts_range()
            if r < 0.35:
                return and_(base, isin(col("etype"), ["click", "view"]))
            return base
        if r < 0.2:
            return self._events_point_day()
        if r < 0.6:
            return self._events_ts_window()
        if r < 0.75:
            return self._events_ts_range()
        if r < 0.88:
            return and_(self._events_ts_window(wide=True), col("amount") > 900.0)
        return col("amount") > float(self.rng.integers(900, 999))

    def _users_pred(self) -> Expr:
        r = self.rng.random()
        uid = int(self.rng.integers(1, self.shape.n_users + 1))
        if r < 0.6:
            return col("user_id").eq(uid)
        if r < 0.85:
            return between(col("user_id"), uid, uid + int(self.rng.integers(1, 50)))
        return col("country").eq("DE")

    def _blob_pred(self) -> Expr:
        r = self.rng.random()
        if r < 0.4:
            return col("cat").eq(str(self.rng.choice(list("ABCDEFGH"))))
        if r < 0.7:
            return col("k") > int(self.rng.integers(1, 20_000))
        return col("score") > float(self.rng.integers(10, 95))

    def _pred_for(self, table: str, *, for_limit: bool = False) -> Expr:
        if table == "events":
            return self._events_pred(for_limit=for_limit)
        if table == "users":
            return self._users_pred()
        return self._blob_pred()

    def _filter_table(self) -> str:
        return str(self.rng.choice(["events", "users", "blob"], p=[0.6, 0.2, 0.2]))

    # -- query constructors ------------------------------------------------

    def _select_no_pred(self) -> q.QuerySpec:
        # Full-table scans hit small tables far more often than big
        # facts — nobody SELECT *s a petabyte (partition-weighted, such
        # scans barely register in the platform-wide pruning ratio).
        t = str(
            self.rng.choice(
                ["tiny", "users", "blob", "events"], p=[0.45, 0.25, 0.2, 0.1]
            )
        )
        return q.QuerySpec(qtype=q.SELECT, table=t)

    def _select_filter(self) -> q.QuerySpec:
        t = self._filter_table()
        return q.QuerySpec(qtype=q.SELECT, table=t, pred=self._pred_for(t))

    def _join(self) -> q.QuerySpec:
        if self.rng.random() < 0.6:
            # Correlated: incidents (contiguous recent event_id block)
            # probe the time-clustered events table.
            join = q.JoinSpec(
                build_table="incidents",
                build_key="event_id",
                probe_key="event_id",
                build_pred=col("severity") >= int(self.rng.integers(2, 5)),
            )
        else:
            # Uncorrelated: selective user set probing events.user_id.
            uid = int(self.rng.integers(1, max(2, self.shape.n_users - 100)))
            join = q.JoinSpec(
                build_table="users",
                build_key="user_id",
                probe_key="user_id",
                build_pred=between(col("user_id"), uid, uid + 80),
            )
        pred = self._events_pred() if self.rng.random() < 0.5 else None
        return q.QuerySpec(qtype=q.SELECT, table="events", pred=pred, join=join)

    def _limit(self, with_pred: bool) -> q.QuerySpec:
        """LIMIT query mirroring Table 2's population.

        Without predicate: mostly small dimension tables whose scan set
        is already a single partition; the rest are exploratory LIMITs
        on larger tables where every partition is fully-matching.
        With predicate: mostly point lookups (minimal after filter
        pruning); range predicates split into pushdown-blocked shapes
        and genuinely prunable ones.
        """
        p = self.profile
        if not with_pred:
            if self.rng.random() < p.p_limit_tiny_table:
                t = "tiny"
            else:
                t = str(self.rng.choice(["events", "blob"], p=[0.7, 0.3]))
            supported = self.rng.random() >= 0.02  # rare agg-shaped LIMITs
            return q.QuerySpec(
                qtype=q.LIMIT, table=t, pred=None, k=self.sample_k(),
                limit_shape_supported=supported,
            )
        r = self.rng.random()
        if r < p.p_limit_point_pred:
            # Point lookups: users by id, or events on a single day.
            if self.rng.random() < 0.5:
                t, pred = "users", self._users_pred()
            else:
                t, pred = "events", self._events_point_day()
            supported = True
        else:
            t = str(self.rng.choice(["events", "blob"], p=[0.85, 0.15]))
            pred = self._pred_for(t, for_limit=True)
            supported = (
                self.rng.random() >= p.p_limit_shape_unsupported
            )
        return q.QuerySpec(
            qtype=q.LIMIT, table=t, pred=pred, k=self.sample_k(),
            limit_shape_supported=supported,
        )

    def _topk(self, *, k_cap: Optional[int] = None) -> q.QuerySpec:
        # Order-column mix: time-clustered columns (ts; event_id, which
        # correlates with ingestion time) appear often — real fact
        # tables order naturally by time — alongside unclustered
        # measures where min/max overlap defeats pruning.
        order_col, table = [
            ("amount", "events"),
            ("ts", "events"),
            ("event_id", "events"),
            ("duration", "events"),
            ("score", "users"),
        ][int(self.rng.choice(5, p=[0.25, 0.3, 0.25, 0.1, 0.1]))]
        pred = None
        if self.rng.random() < self.profile.p_topk_with_pred:
            pred = self._pred_for(table)
        k = self.sample_k(min_k=1)
        if k_cap is not None:
            k = min(k, k_cap)
        return q.QuerySpec(
            qtype=q.TOPK,
            table=table,
            pred=pred,
            k=k,
            order_col=order_col,
            desc=bool(self.rng.random() < 0.8),
            plan_ops=(PlanOp(kind="filter"),) if pred is not None else (),
        )

    def _topk_group_key(self) -> q.QuerySpec:
        return q.QuerySpec(
            qtype=q.TOPK_GROUP_KEY,
            table="events",
            pred=self._events_pred() if self.rng.random() < 0.5 else None,
            k=self.sample_k(min_k=1),
            order_col="country",
            group_cols=("country",),
            desc=True,
            plan_ops=(PlanOp(kind="groupby", group_keys=("country",)),),
        )

    def _topk_group_agg(self) -> q.QuerySpec:
        return q.QuerySpec(
            qtype=q.TOPK_GROUP_AGG,
            table="events",
            pred=self._events_pred() if self.rng.random() < 0.5 else None,
            k=self.sample_k(min_k=1),
            order_col=None,
            group_cols=("country",),
            agg_fn="sum",
            agg_col="amount",
            desc=True,
            plan_ops=(PlanOp(kind="groupby", group_keys=("country",)),),
        )

    # -- sampling ----------------------------------------------------------

    _KINDS = (
        "limit_no_pred",
        "limit_pred",
        "topk",
        "topk_group_key",
        "topk_group_agg",
        "select_no_pred",
        "join",
        "select_filter",
    )

    def _kind_probs(self) -> List[float]:
        p = self.profile
        return [
            p.p_limit_no_pred,
            p.p_limit_pred,
            p.p_topk,
            p.p_topk_group_key,
            p.p_topk_group_agg,
            p.p_select_no_pred,
            p.p_join,
            p.p_select_filter,
        ]

    def sample(self, kind: Optional[str] = None) -> q.QuerySpec:
        if kind is None:
            kind = str(self.rng.choice(self._KINDS, p=self._kind_probs()))
        return {
            "limit_no_pred": lambda: self._limit(with_pred=False),
            "limit_pred": lambda: self._limit(with_pred=True),
            "topk": self._topk,
            "topk_group_key": self._topk_group_key,
            "topk_group_agg": self._topk_group_agg,
            "select_no_pred": self._select_no_pred,
            "join": self._join,
            "select_filter": self._select_filter,
        }[kind]()

    def generate(self, n: int) -> List[q.QuerySpec]:
        """The full SELECT-query mix (Table 1 population)."""
        return [self.sample() for _ in range(n)]

    def generate_limit_workload(self, n: int) -> List[q.QuerySpec]:
        """LIMIT queries only, at Table 1's with/without-predicate ratio."""
        p_no = self.profile.p_limit_no_pred
        p_with = self.profile.p_limit_pred
        share_no = p_no / (p_no + p_with)
        return [
            self._limit(with_pred=self.rng.random() >= share_no)
            for _ in range(n)
        ]

    def generate_topk_workload(
        self, n: int, *, k_cap: Optional[int] = None
    ) -> List[q.QuerySpec]:
        """Plain top-k queries only (Fig. 8 / Fig. 9 population).

        ``k_cap`` bounds k relative to table size: Fig. 8's population
        (queries >= 1 s on production-sized tables) has k tiny relative
        to partition counts, which a cap emulates at reproduction scale.
        """
        return [self._topk(k_cap=k_cap) for _ in range(n)]
