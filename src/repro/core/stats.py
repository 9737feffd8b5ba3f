"""Per-pattern statistics consumed by the cost models and planners.

The paper's cost functions (§4.1) are written in terms of ``W · r_i``
(expected number of events of type i inside the window) and the pairwise
selectivities ``sel_{i,j}``. :class:`PatternStats` precomputes exactly
those quantities for the *positive* part of a pattern:

- negated positions are excluded — the paper plans the positive part and
  inserts the negation check afterwards (§5.3);
- a Kleene position has its count inflated to ``2^{W·r_i}`` — the
  power-set pseudo-type of Theorem 4 (``W · r' = W · 2^{W·r}/W``);
- for sequence patterns the temporal constraints are modelled either
  *exactly* (a k-subset of a totally ordered pattern survives ordering
  with probability 1/k! under iid timestamps — what the lazy NFA and
  ZStream engines actually enforce) or *pairwise* (the literal Theorem 3
  reduction: a 0.5-selectivity predicate between adjacent positions).

All cost functions then reduce to products of ``counts`` and ``sel``
entries, so no separate ``W^k`` term is needed: ``W^k · Π r_i = Π (W·r_i)``.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from .pattern import Op, Pattern

#: Cap on the Kleene inflation exponent so that ``2^{W·r}`` stays a finite,
#: strictly ordered float even for dense streams. Anything above 2^64
#: already dominates every other count in a plan by many orders of
#: magnitude, so the cap never changes a planner's decision.
MAX_KLEENE_EXP = 64.0


@dataclass
class PatternStats:
    """Window-normalized statistics for one simple pattern.

    Attributes
    ----------
    window:
        The pattern's time window W (stream seconds).
    counts:
        ``counts[i] = W · r_i`` for planning position i (Kleene-inflated).
    sel:
        Symmetric ``n×n`` selectivity matrix; ``sel[i][j]`` is the product
        of the selectivities of all predicates between positions i and j
        (diagonal = filter selectivity, 1.0 if none).
    seq_members:
        Bitmask (over planning positions) of positions that are mutually
        temporally ordered. All positive positions for SEQ, 0 for AND.
    temporal_mode:
        ``"exact"`` (1/k! subset factor), ``"pairwise"`` (temporal
        predicates already folded into ``sel``) or ``"none"``.
    positions:
        For each planning position, the index in the original pattern
        (positive positions only, in pattern order).
    kleene:
        Planning positions that carry a Kleene operator.
    last_seq_position:
        Planning position of the temporally last positive event of a SEQ
        pattern (the paper's T_n in §6.1), or ``None`` for AND patterns.
    """

    window: float
    counts: np.ndarray
    sel: np.ndarray
    seq_members: int = 0
    temporal_mode: str = "exact"
    positions: tuple[int, ...] = ()
    kleene: frozenset[int] = frozenset()
    last_seq_position: int | None = None

    # ------------------------------------------------------------------
    @classmethod
    def from_pattern(
        cls,
        pattern: Pattern,
        rates: dict[str, float],
        *,
        temporal_mode: str = "exact",
    ) -> "PatternStats":
        """Build planning statistics from a simple pattern and type rates."""
        if pattern.op is Op.OR:
            raise ValueError("build stats per conjunctive subpattern (use to_dnf)")
        if temporal_mode not in ("exact", "pairwise", "none"):
            raise ValueError(f"unknown temporal_mode {temporal_mode!r}")
        pos = pattern.positive()
        n = len(pos)
        counts = np.empty(n, dtype=float)
        for k, i in enumerate(pos):
            c = pattern.window * rates[pattern.types[i]]
            if i in pattern.kleene:
                c = 2.0 ** min(c, MAX_KLEENE_EXP)
            counts[k] = c
        sel = np.ones((n, n), dtype=float)
        back = {i: k for k, i in enumerate(pos)}
        for p in pattern.predicates:
            if p.i in back and p.j in back:
                a, b = back[p.i], back[p.j]
                sel[a, b] *= p.sel
                if a != b:
                    sel[b, a] *= p.sel
        seq_members = 0
        mode = temporal_mode
        if pattern.op is Op.SEQ and n > 1:
            if mode == "exact":
                seq_members = (1 << n) - 1
            elif mode == "pairwise":
                # Theorem 3 reduction: adjacent ts_lt predicates, sel 0.5.
                for k in range(n - 1):
                    sel[k, k + 1] *= 0.5
                    sel[k + 1, k] *= 0.5
        else:
            mode = "none"
        last = n - 1 if pattern.op is Op.SEQ and n > 0 else None
        return cls(
            window=pattern.window,
            counts=counts,
            sel=sel,
            seq_members=seq_members,
            temporal_mode=mode,
            positions=pos,
            kleene=frozenset(back[i] for i in pattern.kleene if i in back),
            last_seq_position=last,
        )

    # ------------------------------------------------------------------
    @property
    def n(self) -> int:
        """Number of planning positions."""
        return len(self.counts)

    def total_count(self) -> float:
        """Σ_i W·r_i — the normalizer for the latency cost (§6.1)."""
        return float(self.counts.sum())

    def temporal_factor(self, mask: int) -> float:
        """Probability that the seq-members of ``mask`` arrive in order."""
        if self.temporal_mode != "exact" or not (mask & self.seq_members):
            return 1.0
        k = (mask & self.seq_members).bit_count()
        return 1.0 / math.factorial(k)

    def pm_of_mask(self, mask: int) -> float:
        """Expected number of partial matches over the subset ``mask``.

        This is the paper's PM(k) (§4.1) / PM(node) (§4.2) written for an
        arbitrary subset: ``Π_{i∈mask} (W·r_i)·sel_{i,i} · Π_{i<j∈mask}
        sel_{i,j}``, times the temporal factor.
        """
        members = [i for i in range(self.n) if mask >> i & 1]
        v = 1.0
        for a, i in enumerate(members):
            v *= self.counts[i] * self.sel[i, i]
            for j in members[a + 1 :]:
                v *= self.sel[i, j]
        return v * self.temporal_factor(mask)

    def extend_factor(self, mask: int, t: int) -> float:
        """Multiplier taking PM(mask) to PM(mask | 1<<t).

        Used by the incremental planners (GREEDY, DP-LD): the new event
        contributes its own count, its filter, its predicates against every
        current member, and — for sequence patterns in exact mode — the
        1/(k+1) incremental ordering factor.
        """
        if mask >> t & 1:
            raise ValueError("position already in mask")
        v = self.counts[t] * self.sel[t, t]
        for i in range(self.n):
            if mask >> i & 1:
                v *= self.sel[i, t]
        if self.temporal_mode == "exact" and (self.seq_members >> t & 1):
            k = (mask & self.seq_members).bit_count()
            v /= k + 1
        return v

    def combine_factor(self, mask_a: int, mask_b: int) -> float:
        """Selectivity of joining two disjoint partial matches.

        The paper's SEL_LR(in) (§4.2): the product of selectivities of all
        predicates between the two leaf sets, times the temporal
        reordering factor for sequence patterns
        (``a! · b! / (a+b)!`` in exact mode).
        """
        if mask_a & mask_b:
            raise ValueError("masks must be disjoint")
        v = 1.0
        for i in range(self.n):
            if not (mask_a >> i & 1):
                continue
            for j in range(self.n):
                if mask_b >> j & 1:
                    v *= self.sel[i, j]
        if self.temporal_mode == "exact":
            a = (mask_a & self.seq_members).bit_count()
            b = (mask_b & self.seq_members).bit_count()
            if a and b:
                v *= math.factorial(a) * math.factorial(b) / math.factorial(a + b)
        return v
