"""The paper's evaluation experiments as table-producing harnesses (§7).

Every function returns ``(rows, rendered_text)``; the rows are what the
corresponding paper figure plots (DESIGN.md §5 maps tables ↔ figures):

- :func:`table1` — Figs 4–5: average throughput & memory per pattern
  category × algorithm (order- and tree-based), join engine.
- :func:`table2` — Figs 6–15: throughput & memory vs pattern size.
- :func:`table3` — Fig 16: measured performance vs plan cost.
- :func:`table4` — Fig 17: normalized plan cost & generation time vs
  pattern size (planner-only; DP algorithms capped like the paper's 50 h
  DP-B run at n=22 forces).
- :func:`table5` — Fig 18: throughput/latency trade-off for α ∈ {0,.5,1}.
- :func:`table6` — Fig 19: throughput per event selection strategy.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.cep.event_engine import run_metrics
from repro.cep.join_engine import execute_pattern
from repro.core.cost_model import Objective
from repro.core.order_algorithms import ORDER_ALGORITHMS, ii_random
from repro.core.pattern import Op, Pattern
from repro.core.planner import ALGORITHM_KIND, plan_pattern
from repro.core.plans import left_deep_tree
from repro.core.stats import PatternStats
from repro.core.tree_algorithms import TREE_ALGORITHMS
from repro.streams.estimation import StreamStatistics, estimate
from repro.streams.stock import StreamConfig, stock_events_pdf
from repro.workloads.generator import CATEGORIES, make_pattern, make_pattern_set
from .report import format_table

ORDER_ALGS = ("TRIVIAL", "EFREQ", "GREEDY", "II-RANDOM", "II-GREEDY", "DP-LD")
TREE_ALGS = ("ZSTREAM", "ZSTREAM-ORD", "DP-B")
JQPG_ALGS = ("GREEDY", "II-RANDOM", "II-GREEDY", "DP-LD", "ZSTREAM-ORD", "DP-B")


@dataclass(frozen=True)
class ExperimentConfig:
    """Scale knobs shared by the experiment harnesses.

    Benchmarks use the defaults; the ``jobs/`` entrypoints expose them as
    CLI flags for paper-scale runs.
    """

    stream: StreamConfig = StreamConfig()
    categories: tuple[str, ...] = CATEGORIES
    sizes: tuple[int, ...] = (3, 4, 5)
    per_size: int = 2
    algorithms: tuple[str, ...] = ORDER_ALGS + TREE_ALGS
    dp_ld_max_n: int = 16
    dp_b_max_n: int = 12
    seed: int = 0

    def skip(self, algorithm: str, n: int) -> bool:
        """DP caps: the paper reports 50 h for DP-B at n=22 (Fig 17b)."""
        if algorithm == "DP-LD" and n > self.dp_ld_max_n:
            return True
        if algorithm in ("DP-B", "ZSTREAM", "ZSTREAM-ORD") and n > self.dp_b_max_n:
            return True
        return False


@dataclass
class Workbench:
    """Cached stream + statistics + Spark events shared across tables."""

    spark: SparkSession
    cfg: ExperimentConfig
    events_pdf: object = field(init=False)
    stats: StreamStatistics = field(init=False)
    events: object = field(init=False)

    def __post_init__(self) -> None:
        self.events_pdf = stock_events_pdf(self.cfg.stream)
        self.stats = estimate(
            self.events_pdf, self.cfg.stream.duration, seed=self.cfg.seed
        )
        self.events = self.spark.createDataFrame(self.events_pdf).persist()
        self.events.count()
        # Precompute the stream measurements once for every run_join call.
        n_windows = int(self.events_pdf["wid"].nunique())
        per_window = {
            s: c / n_windows
            for s, c in self.events_pdf["symbol"].value_counts().items()
        }
        self.measured = (per_window, len(self.events_pdf), n_windows)

    def close(self) -> None:
        self.events.unpersist()

    # ------------------------------------------------------------------
    def rates_of(self, pattern: Pattern) -> dict[str, float]:
        subs = pattern.subpatterns if pattern.op is Op.OR else (pattern,)
        return {t: self.stats.rates[t] for sp in subs for t in sp.types}

    def run_join(
        self, pattern: Pattern, algorithm: str, *, alpha=0.0, strategy="any"
    ) -> dict:
        """Plan + execute on the join engine; one result row."""
        planned = plan_pattern(
            pattern,
            self.rates_of(pattern),
            algorithm,
            alpha=alpha,
            strategy="any" if strategy == "any" else "next",
            seed=self.cfg.seed,
        )
        _, m = execute_pattern(
            self.spark, self.events, planned, strategy=strategy,
            measured=self.measured,
        )
        return {
            "algorithm": algorithm,
            "kind": ALGORITHM_KIND[algorithm],
            "size": pattern.size,
            "throughput": m.throughput,
            "memory": m.memory_proxy,
            "matches": m.n_matches,
            "latency": m.latency_surrogate,
            "raw_cost": float(sum(pp.raw_cost for pp in planned)),
            "gen_seconds": float(sum(pp.gen_seconds for pp in planned)),
        }


# ---------------------------------------------------------------------------
# Tables 1 & 2 — Figures 4–5 and 6–15
# ---------------------------------------------------------------------------


def _grid_rows(bench: Workbench, categories, sizes, per_size) -> list[dict]:
    rows = []
    for category in categories:
        patterns = make_pattern_set(
            category, sizes, per_size, bench.stats, bench.cfg.stream.window,
            seed=bench.cfg.seed,
        )
        for pattern in patterns:
            for alg in bench.cfg.algorithms:
                if bench.cfg.skip(alg, pattern.size):
                    continue
                row = bench.run_join(pattern, alg)
                row["category"] = category
                rows.append(row)
    return rows


def _avg(rows, keys, metrics=("throughput", "memory")) -> list[dict]:
    """Group rows by ``keys`` and average the metric columns."""
    groups: dict[tuple, list[dict]] = {}
    for r in rows:
        groups.setdefault(tuple(r[k] for k in keys), []).append(r)
    out = []
    for key, grp in sorted(groups.items(), key=lambda kv: str(kv[0])):
        row = dict(zip(keys, key))
        for m in metrics:
            row[m] = float(np.mean([g[m] for g in grp]))
        row["n"] = len(grp)
        out.append(row)
    return out


def table1(spark: SparkSession, cfg: ExperimentConfig | None = None):
    """Figs 4–5: avg throughput & memory per category × algorithm."""
    cfg = cfg or ExperimentConfig()
    bench = Workbench(spark, cfg)
    try:
        raw = _grid_rows(bench, cfg.categories, cfg.sizes, cfg.per_size)
    finally:
        bench.close()
    rows = _avg(raw, ("category", "kind", "algorithm"))
    text = format_table(
        rows, ["category", "kind", "algorithm", "throughput", "memory", "n"]
    )
    return rows, text


def table2(spark: SparkSession, cfg: ExperimentConfig | None = None):
    """Figs 6–15: throughput & memory as a function of pattern size."""
    cfg = cfg or ExperimentConfig()
    bench = Workbench(spark, cfg)
    try:
        raw = _grid_rows(bench, cfg.categories, cfg.sizes, cfg.per_size)
    finally:
        bench.close()
    rows = _avg(raw, ("category", "size", "kind", "algorithm"))
    text = format_table(
        rows,
        ["category", "size", "kind", "algorithm", "throughput", "memory", "n"],
    )
    return rows, text


# ---------------------------------------------------------------------------
# Table 3 — Figure 16: cost-model validation
# ---------------------------------------------------------------------------


def table3(spark: SparkSession, cfg: ExperimentConfig | None = None):
    """Fig 16: measured throughput/memory vs the plan's §4 cost.

    Executes a spread of plans (all algorithms × patterns), then reports
    per-plan rows plus the two aggregate statistics the paper eyeballs:
    the log–log slope of throughput vs cost (≈ −c, the paper's 1/x^c)
    and the Spearman correlation of memory vs cost (≈ linear).
    """
    cfg = cfg or ExperimentConfig(categories=("sequence", "conjunction"))
    bench = Workbench(spark, cfg)
    try:
        raw = _grid_rows(bench, cfg.categories, cfg.sizes, cfg.per_size)
    finally:
        bench.close()
    rows = [
        {
            "algorithm": r["algorithm"],
            "kind": r["kind"],
            "size": r["size"],
            "cost": r["raw_cost"],
            "throughput": r["throughput"],
            "memory": r["memory"],
        }
        for r in raw
    ]
    cost = np.array([r["cost"] for r in rows])
    thr = np.array([r["throughput"] for r in rows])
    mem = np.array([max(r["memory"], 1) for r in rows])

    def spearman(a, b):
        ra = np.argsort(np.argsort(a)).astype(float)
        rb = np.argsort(np.argsort(b)).astype(float)
        ra -= ra.mean()
        rb -= rb.mean()
        denom = np.sqrt((ra**2).sum() * (rb**2).sum())
        return float((ra * rb).sum() / denom) if denom else 0.0

    slope = float(
        np.polyfit(np.log(cost), np.log(thr), 1)[0]
    )
    summary = {
        "loglog_slope_throughput_vs_cost": slope,
        "spearman_cost_vs_memory": spearman(cost, mem),
        "spearman_cost_vs_throughput": spearman(cost, thr),
        "n_plans": len(rows),
    }
    text = (
        format_table(rows, ["algorithm", "kind", "size", "cost", "throughput", "memory"])
        + "\n\nsummary: "
        + ", ".join(f"{k}={v:.4g}" if isinstance(v, float) else f"{k}={v}" for k, v in summary.items())
    )
    return {"rows": rows, "summary": summary}, text


# ---------------------------------------------------------------------------
# Table 4 — Figure 17: large-plan generation (planner-only)
# ---------------------------------------------------------------------------


def table4(
    spark: SparkSession | None = None,
    cfg: ExperimentConfig | None = None,
    *,
    sizes: tuple[int, ...] = (3, 6, 9, 12, 14, 16),
    per_size: int = 3,
    algorithms: tuple[str, ...] = (
        "EFREQ",
        "GREEDY",
        "II-GREEDY",
        "DP-LD",
        "ZSTREAM",
        "DP-B",
    ),
):
    """Fig 17: normalized plan cost & generation time vs pattern size.

    Pure planner benchmark — no execution. ``normalized cost`` follows the
    paper: cost of the plan generated by the empirically worst algorithm
    (EFREQ) divided by this plan's cost (higher is better). Needs only
    statistics, so the stream is never materialized in Spark.
    """
    cfg = cfg or ExperimentConfig(
        stream=StreamConfig(n_symbols=max(24, max(sizes) + 2))
    )
    events_pdf = stock_events_pdf(cfg.stream)
    stats = estimate(events_pdf, cfg.stream.duration, seed=cfg.seed)
    rows = []
    for size in sizes:
        per_alg: dict[str, list[dict]] = {a: [] for a in algorithms}
        for k in range(per_size):
            pattern = make_pattern(
                "sequence", size, stats, cfg.stream.window, seed=cfg.seed + 997 * size + k
            )
            pstats = PatternStats.from_pattern(
                pattern, stats.rates_for(pattern.types)
            )
            obj = Objective(pstats)
            base = ORDER_ALGORITHMS["EFREQ"](obj)
            # Tree costs include the per-leaf buffer terms the order model
            # lacks, so tree plans are normalized against EFREQ's order
            # realized as a left-deep tree (apples to apples).
            base_tree = obj.tree_cost(left_deep_tree(base.plan.order))
            for alg in algorithms:
                if cfg.skip(alg, size):
                    continue
                fn = ORDER_ALGORITHMS.get(alg) or TREE_ALGORITHMS[alg]
                res = fn(obj, seed=cfg.seed) if fn is ii_random else fn(obj)
                ref = base_tree if alg in TREE_ALGORITHMS else base.cost
                per_alg[alg].append(
                    {
                        "norm_cost": ref / max(res.cost, 1e-300),
                        "gen_seconds": res.gen_seconds,
                    }
                )
        for alg in algorithms:
            if not per_alg[alg]:
                continue
            rows.append(
                {
                    "size": size,
                    "algorithm": alg,
                    "norm_cost": float(
                        np.mean([r["norm_cost"] for r in per_alg[alg]])
                    ),
                    "gen_seconds": float(
                        np.mean([r["gen_seconds"] for r in per_alg[alg]])
                    ),
                }
            )
    text = format_table(rows, ["size", "algorithm", "norm_cost", "gen_seconds"])
    return rows, text


# ---------------------------------------------------------------------------
# Table 5 — Figure 18: throughput vs latency (α sweep)
# ---------------------------------------------------------------------------


def table5(
    spark: SparkSession,
    cfg: ExperimentConfig | None = None,
    *,
    alphas: tuple[float, ...] = (0.0, 0.5, 1.0),
    algorithms: tuple[str, ...] = JQPG_ALGS,
):
    """Fig 18: throughput and latency of the 6 JQPG planners per α."""
    cfg = cfg or ExperimentConfig(categories=("sequence",))
    bench = Workbench(spark, cfg)
    try:
        patterns = make_pattern_set(
            "sequence", cfg.sizes, cfg.per_size, bench.stats,
            cfg.stream.window, seed=cfg.seed,
        )
        raw = []
        for alpha in alphas:
            for pattern in patterns:
                for alg in algorithms:
                    if cfg.skip(alg, pattern.size):
                        continue
                    row = bench.run_join(pattern, alg, alpha=alpha)
                    row["alpha"] = alpha
                    raw.append(row)
    finally:
        bench.close()
    rows = _avg(raw, ("algorithm", "alpha"), metrics=("throughput", "latency"))
    text = format_table(rows, ["algorithm", "alpha", "throughput", "latency", "n"])
    return rows, text


# ---------------------------------------------------------------------------
# Table 6 — Figure 19: event selection strategies
# ---------------------------------------------------------------------------


def table6(
    spark: SparkSession,
    cfg: ExperimentConfig | None = None,
    *,
    strategies: tuple[str, ...] = ("any", "next", "contiguity"),
):
    """Fig 19: throughput of every algorithm per selection strategy.

    Uses the event engine (lazy NFA / instance trees via applyInPandas):
    skip-till-next-match consumption and the buffering/reordering overhead
    that makes TRIVIAL win under contiguity are sequential semantics the
    join dataflow cannot express (DESIGN.md §3).
    """
    cfg = cfg or ExperimentConfig(categories=("sequence",))
    bench = Workbench(spark, cfg)
    try:
        patterns = make_pattern_set(
            "sequence", cfg.sizes, cfg.per_size, bench.stats,
            cfg.stream.window, seed=cfg.seed,
        )
        raw = []
        for strategy in strategies:
            plan_strategy = "any" if strategy == "any" else "next"
            for pattern in patterns:
                for alg in cfg.algorithms:
                    if cfg.skip(alg, pattern.size):
                        continue
                    planned = plan_pattern(
                        pattern,
                        bench.rates_of(pattern),
                        alg,
                        strategy=plan_strategy,
                        seed=cfg.seed,
                    )[0]
                    plan = planned.order_plan or planned.tree_plan
                    _, m = run_metrics(
                        spark, bench.events, pattern, plan, strategy=strategy
                    )
                    raw.append(
                        {
                            "strategy": strategy,
                            "algorithm": alg,
                            "kind": ALGORITHM_KIND[alg],
                            "throughput": m.throughput,
                            "memory": m.memory_proxy,
                            "matches": m.n_matches,
                        }
                    )
    finally:
        bench.close()
    rows = _avg(
        raw, ("strategy", "kind", "algorithm"),
        metrics=("throughput", "memory", "matches"),
    )
    text = format_table(
        rows,
        ["strategy", "kind", "algorithm", "throughput", "memory", "matches", "n"],
    )
    return rows, text
