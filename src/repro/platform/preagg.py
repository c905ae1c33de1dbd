"""Pre-aggregate tree over successive dates (§4.3, Figure 6).

A segment tree over a contiguous day range: each non-leaf node is the
aggregate (sumBSI by default) of its two children, so aggregating any
day range [lo, hi] merges O(log n) nodes instead of hi - lo + 1 — the
paper's example: days 1..7 from nodes (1234), (56), (7), i.e. 3 merges.

One tree instance covers one (segment, metric); the Spark pipeline
builds them per group inside applyInPandas.
"""
from __future__ import annotations

from typing import Callable

from repro.bsi.bsi import BSI


class PreAggTree:
    """Segment tree of BSIs over days ``first_day .. first_day+n-1``."""

    def __init__(
        self,
        day_bsis: dict[int, BSI],
        *,
        first_day: int,
        n_days: int,
        combine: Callable[[BSI, BSI], BSI] | None = None,
    ):
        if n_days < 1:
            raise ValueError("n_days must be >= 1")
        self.first_day = first_day
        self.n_days = n_days
        self.combine = combine or (lambda a, b: a.add(b))
        size = 1
        while size < n_days:
            size *= 2
        self.size = size
        # 1-indexed heap layout; leaves at [size, 2*size)
        self.nodes: list[BSI] = [BSI.empty() for _ in range(2 * size)]
        for d in range(n_days):
            b = day_bsis.get(first_day + d)
            if b is not None:
                self.nodes[size + d] = b
        for i in range(size - 1, 0, -1):
            self.nodes[i] = self.combine(self.nodes[2 * i], self.nodes[2 * i + 1])

    def _covering(self, lo_day: int, hi_day: int) -> list[int]:
        """Canonical decomposition of [lo_day, hi_day] into node ids."""
        lo = lo_day - self.first_day
        hi = hi_day - self.first_day
        if lo < 0 or hi >= self.n_days or lo > hi:
            raise ValueError(f"day range [{lo_day}, {hi_day}] outside tree")
        out = []
        l, r = lo + self.size, hi + self.size + 1
        while l < r:
            if l & 1:
                out.append(l)
                l += 1
            if r & 1:
                r -= 1
                out.append(r)
            l //= 2
            r //= 2
        return sorted(out)

    def nodes_merged(self, lo_day: int, hi_day: int) -> int:
        """How many tree nodes a range query touches (Fig. 6 claim)."""
        return len(self._covering(lo_day, hi_day))

    def query(self, lo_day: int, hi_day: int) -> BSI:
        """Aggregate of days lo..hi inclusive, merging covering nodes."""
        ids = self._covering(lo_day, hi_day)
        acc = BSI.empty()
        for i in ids:
            acc = self.combine(acc, self.nodes[i])
        return acc
