"""Shared helpers for the test suite: random pattern/stats instances."""
from __future__ import annotations

import numpy as np

from repro.core.pattern import Op, Pattern, Predicate
from repro.core.stats import PatternStats


def random_pattern(
    n: int,
    seed: int,
    *,
    op: Op = Op.AND,
    pred_prob: float = 0.5,
    window: float | None = None,
    negated: tuple[int, ...] = (),
    kleene: tuple[int, ...] = (),
) -> tuple[Pattern, dict[str, float]]:
    """A random simple pattern over types ``T0..T{n-1}`` plus random rates."""
    g = np.random.default_rng(seed)
    types = tuple(f"T{i}" for i in range(n))
    preds = []
    for i in range(n):
        for j in range(i + 1, n):
            if g.random() < pred_prob:
                preds.append(
                    Predicate(i, j, kind="diff_lt", sel=float(g.uniform(0.01, 1.0)))
                )
    rates = {t: float(10 ** g.uniform(-1, 1)) for t in types}
    w = window if window is not None else float(10 ** g.uniform(0, 2))
    pat = Pattern(
        op, types, tuple(preds), w, frozenset(negated), frozenset(kleene)
    )
    return pat, rates


def random_stats(
    n: int,
    seed: int,
    *,
    op: Op = Op.AND,
    temporal_mode: str = "none",
    pred_prob: float = 0.5,
) -> PatternStats:
    pat, rates = random_pattern(n, seed, op=op, pred_prob=pred_prob)
    return PatternStats.from_pattern(pat, rates, temporal_mode=temporal_mode)
