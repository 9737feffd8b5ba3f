"""Event-at-a-time CEP as a distributed Spark operator.

The pure-Python detectors of :mod:`repro.cep.detectors` are data-parallel
across time windows: the stream is grouped by tumbling window id and each
window is detected independently inside ``applyInPandas`` (the standard
way to run a custom streaming operator on the Spark DataFrame API).

Two entry points:

- :func:`run_metrics` — per-window cost rows (events, matches, peak
  partial matches, comparisons, latency) aggregated into
  :class:`~repro.cep.metrics.ExecutionMetrics`;
- :func:`run_matches` — the actual matches (one ``p{i}_id`` column per
  pattern position), used by the correctness tests to cross-validate
  against the join engine and the DuckDB oracle.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.pattern import Pattern
from repro.core.plans import OrderPlan, TreePlan
from .detectors import DetectorResult, detect_order, detect_tree
from .metrics import ExecutionMetrics

_METRIC_SCHEMA = T.StructType(
    [
        T.StructField("wid", T.LongType()),
        T.StructField("n_events", T.LongType()),
        T.StructField("n_matches", T.LongType()),
        T.StructField("peak_partials", T.LongType()),
        T.StructField("comparisons", T.LongType()),
        T.StructField("sum_latency", T.DoubleType()),
    ]
)


def _detect(window: pd.DataFrame, pattern, plan, strategy) -> DetectorResult:
    if isinstance(plan, OrderPlan):
        return detect_order(window, pattern, plan, strategy)
    if isinstance(plan, TreePlan):
        return detect_tree(window, pattern, plan, strategy)
    raise TypeError(f"unsupported plan type {type(plan)!r}")


def run_metrics(
    spark: SparkSession,
    events: DataFrame,
    pattern: Pattern,
    plan: OrderPlan | TreePlan,
    *,
    strategy: str = "any",
) -> tuple[pd.DataFrame, ExecutionMetrics]:
    """Detect per window; return (per-window rows, aggregated metrics)."""

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        r = _detect(pdf, pattern, plan, strategy)
        return pd.DataFrame(
            {
                "wid": [int(pdf["wid"].iloc[0])],
                "n_events": [len(pdf)],
                "n_matches": [r.n_matches],
                "peak_partials": [r.peak_partials],
                "comparisons": [r.comparisons],
                "sum_latency": [float(sum(r.match_latencies))],
            }
        )

    t0 = time.perf_counter()
    rows = events.groupBy("wid").applyInPandas(fn, schema=_METRIC_SCHEMA).toPandas()
    wall = time.perf_counter() - t0
    n_events = int(events.count())
    n_matches = int(rows["n_matches"].sum())
    metrics = ExecutionMetrics(
        strategy=strategy,
        n_events=n_events,
        n_windows=len(rows),
        intermediate_counts=[int(x) for x in rows["peak_partials"]],
        n_matches=n_matches,
        wall_seconds=wall,
        latency_surrogate=(
            float(rows["sum_latency"].sum()) / n_matches if n_matches else 0.0
        ),
    )
    return rows, metrics


def run_matches(
    spark: SparkSession,
    events: DataFrame,
    pattern: Pattern,
    plan: OrderPlan | TreePlan,
    *,
    strategy: str = "any",
) -> DataFrame:
    """Detect per window; return the match id tuples as a DataFrame."""
    n = len(pattern.types)
    cols = [f"p{i}_id" for i in range(n)]
    schema = T.StructType([T.StructField(c, T.LongType()) for c in cols])

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        r = _detect(pdf, pattern, plan, strategy)
        return pd.DataFrame(r.matches, columns=cols)

    return events.groupBy("wid").applyInPandas(fn, schema=schema)
