"""Event-at-a-time CEP detectors (paper §2.2–§2.3), pure Python.

Two evaluation mechanisms over the events of ONE time window, processed
in arrival (serial) order:

- :func:`detect_order` — the out-of-order lazy NFA of [29]: a chain of
  states following an evaluation order; out-of-order events are buffered
  and retrieved when their state is reached.
- :func:`detect_tree` — the instance-based ZStream model of [35]: events
  enter leaves, instances combine with sibling-node instances upward.

Both support the §6.2 selection strategies:

- ``any`` (skip-till-any-match) — every combination detected;
- ``next`` (skip-till-next-match) — events are consumed by the first full
  match they complete and removed from buffers/partials;
- ``contiguity`` — strict contiguity (global-serial adjacency between
  pattern-adjacent events) with consumption.

Metrics measured per run: peak concurrent partial matches (memory),
predicate comparisons (work), and per-match latency = comparisons
performed between the arrival of the match's final primitive event and
its emission (§6.1's definition, measured rather than estimated).

Restricted to pure SEQ/AND patterns (no NOT/KL) — the join engine covers
those categories; the event engine exists for consumption semantics and
latency, which the paper evaluates on pure sequences (Figs 18–19).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.pattern import Op, Pattern
from repro.core.plans import OrderPlan, TreeNode, TreePlan

STRATEGIES = ("any", "next", "contiguity")


@dataclass
class DetectorResult:
    """Matches and measured cost of one window's detection."""

    matches: list[tuple[int, ...]]  # event ids, indexed by pattern position
    n_events: int
    peak_partials: int = 0
    comparisons: int = 0
    match_latencies: list[int] = field(default_factory=list)

    @property
    def n_matches(self) -> int:
        return len(self.matches)

    @property
    def avg_latency(self) -> float:
        if not self.match_latencies:
            return 0.0
        return float(np.mean(self.match_latencies))


class _Event:
    """One primitive event (plain attributes beat dict lookups here)."""

    __slots__ = ("id", "pos", "ts", "serial", "diff")

    def __init__(self, id_, pos, ts, serial, diff):
        self.id = id_
        self.pos = pos
        self.ts = ts
        self.serial = serial
        self.diff = diff


def _check(pattern: Pattern, a: _Event, b: _Event, strategy: str) -> bool:
    """All pattern constraints between two bound events (one comparison)."""
    i, j = (a, b) if a.pos < b.pos else (b, a)
    if pattern.op is Op.SEQ:
        if not (i.ts < j.ts):
            return False
    elif i.pos != j.pos and i.id == j.id:
        return False
    if strategy == "contiguity" and j.pos == i.pos + 1:
        if j.serial != i.serial + 1:
            return False
    for q in pattern.predicates:
        if (q.i, q.j) != (i.pos, j.pos):
            continue
        if q.kind == "diff_lt" and not (i.diff < j.diff):
            return False
        if q.kind == "diff_gt" and not (i.diff > j.diff):
            return False
        if q.kind == "ts_lt" and not (i.ts < j.ts):
            return False
        if q.kind == "serial_adj" and j.serial != i.serial + 1:
            return False
    return True


def _events_of(window: pd.DataFrame, pattern: Pattern) -> list[_Event]:
    """Window rows → `_Event`s for positions of this pattern, serial order."""
    pos_of = {t: i for i, t in enumerate(pattern.types)}
    if len(pos_of) != len(pattern.types):
        raise ValueError("event engine requires distinct types per pattern")
    out = []
    sub = window[window["symbol"].isin(pos_of)].sort_values("serial")
    for row in sub.itertuples(index=False):
        out.append(
            _Event(int(row.event_id), pos_of[row.symbol], float(row.ts),
                   int(row.serial), float(row.diff))
        )
    return out


def _validate(pattern: Pattern, strategy: str) -> None:
    if strategy not in STRATEGIES:
        raise ValueError(f"unknown strategy {strategy!r}")
    if pattern.negated or pattern.kleene or pattern.op is Op.OR:
        raise ValueError("event detectors support pure SEQ/AND patterns only")


# ---------------------------------------------------------------------------
# Order-based detection: the lazy NFA of §2.2
# ---------------------------------------------------------------------------


def detect_order(
    window: pd.DataFrame,
    pattern: Pattern,
    plan: OrderPlan,
    strategy: str = "any",
) -> DetectorResult:
    """Lazy-NFA detection of a pure pattern over one window's events."""
    _validate(pattern, strategy)
    order = list(plan.order)  # planning == pattern positions for pure patterns
    n = len(order)
    state_of = {p: k for k, p in enumerate(order)}
    events = _events_of(window, pattern)
    res = DetectorResult(matches=[], n_events=len(events))
    buffers: list[list[_Event]] = [[] for _ in range(n)]
    partials: list[list[tuple[_Event, ...]]] = [[] for _ in range(n + 1)]
    consume = strategy in ("next", "contiguity")
    consumed: set[int] = set()
    live = 0
    ops_at_arrival = 0

    def emit(p: tuple[_Event, ...]) -> None:
        nonlocal live
        by_pos = sorted(p, key=lambda e: e.pos)
        res.matches.append(tuple(e.id for e in by_pos))
        res.match_latencies.append(res.comparisons - ops_at_arrival)
        if consume:
            ids = {e.id for e in p}
            consumed.update(ids)
            for buf in buffers:
                buf[:] = [e for e in buf if e.id not in ids]
            for k in range(1, n):
                kept = [q for q in partials[k] if not any(e.id in ids for e in q)]
                live -= len(partials[k]) - len(kept)
                partials[k][:] = kept

    def compat(p: tuple[_Event, ...], e: _Event) -> bool:
        for b in p:
            res.comparisons += 1
            if not _check(pattern, b, e, strategy):
                return False
        return True

    def add_partial(p: tuple[_Event, ...], k: int) -> None:
        nonlocal live
        if k == n:
            emit(p)
            return
        partials[k].append(p)
        live += 1
        res.peak_partials = max(res.peak_partials, live)
        # Lazy retrieval: combine with already-buffered events of the
        # next state's type (§2.2).
        for b in list(buffers[state_of[order[k]]]):
            if consume and (b.id in consumed or any(e.id in consumed for e in p)):
                continue
            if compat(p, b):
                add_partial(p + (b,), k + 1)

    for e in events:
        ops_at_arrival = res.comparisons
        k = state_of[e.pos]
        if k == 0:
            add_partial((e,), 1)
        else:
            for p in list(partials[k]):
                if consume and any(x.id in consumed for x in p):
                    continue
                if compat(p, e):
                    add_partial(p + (e,), k + 1)
                    if consume and e.id in consumed:
                        break
        if not (consume and e.id in consumed):
            buffers[k].append(e)
    return res


# ---------------------------------------------------------------------------
# Tree-based detection: the instance model of §2.3
# ---------------------------------------------------------------------------


def detect_tree(
    window: pd.DataFrame,
    pattern: Pattern,
    plan: TreePlan,
    strategy: str = "any",
) -> DetectorResult:
    """Instance-tree (ZStream-style) detection over one window's events."""
    _validate(pattern, strategy)
    events = _events_of(window, pattern)
    res = DetectorResult(matches=[], n_events=len(events))
    root = plan.root
    parent: dict[int, TreeNode] = {}
    leaf_node: dict[int, TreeNode] = {}
    for node in root.nodes():
        if node.is_leaf():
            leaf_node[node.leaf] = node
        else:
            parent[node.left.mask] = node
            parent[node.right.mask] = node
    instances: dict[int, list[tuple[_Event, ...]]] = {
        node.mask: [] for node in root.nodes()
    }
    consume = strategy in ("next", "contiguity")
    consumed: set[int] = set()
    live = 0
    ops_at_arrival = 0

    def emit(inst: tuple[_Event, ...]) -> None:
        nonlocal live
        by_pos = sorted(inst, key=lambda e: e.pos)
        res.matches.append(tuple(e.id for e in by_pos))
        res.match_latencies.append(res.comparisons - ops_at_arrival)
        if consume:
            ids = {e.id for e in inst}
            consumed.update(ids)
            for mask, lst in instances.items():
                kept = [q for q in lst if not any(e.id in ids for e in q)]
                live -= len(lst) - len(kept)
                lst[:] = kept

    def compat(a: tuple[_Event, ...], b: tuple[_Event, ...]) -> bool:
        for x in a:
            for y in b:
                res.comparisons += 1
                if not _check(pattern, x, y, strategy):
                    return False
        return True

    def add_instance(node: TreeNode, inst: tuple[_Event, ...]) -> None:
        nonlocal live
        if node is root:
            emit(inst)
            return
        instances[node.mask].append(inst)
        live += 1
        res.peak_partials = max(res.peak_partials, live)
        par = parent[node.mask]
        sib = par.right if par.left is node else par.left
        for other in list(instances[sib.mask]):
            if consume and (
                any(e.id in consumed for e in inst)
                or any(e.id in consumed for e in other)
            ):
                continue
            if compat(inst, other):
                merged = inst + other if par.left is node else other + inst
                add_instance(par, merged)
                if consume and any(e.id in consumed for e in inst):
                    return

    for e in events:
        ops_at_arrival = res.comparisons
        add_instance(leaf_node[e.pos], (e,))
    return res
