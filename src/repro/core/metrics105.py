"""Synthetic catalog of the paper's "105 core metrics" (§6.1).

Table 3 gives the value-range-cardinality histogram of the real 105
WeChat core metrics. We reproduce the catalog *by construction*: 105
:class:`MetricSpec`s whose range-cardinality classes follow exactly the
paper's class counts. Because our user universe is ~10^5-10^6 rather
than WeChat's ~10^9, configured ranges above ``value_cap`` are capped
(a day's realized cardinality can never exceed the row count anyway);
the capping is reported by the Table 3/4 jobs.

Also defines the three "typical metrics" A/B/C of Tables 5/6, scaled
x1e-3 in rows from the paper (316M/34M/510M -> 316k/34k/510k).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

# Paper Table 3: (range-cardinality class hi exclusive bound base-10) -> count
TABLE3_CLASSES: list[tuple[int, int, int]] = [
    # (lo, hi], number of metrics
    (0, 10, 33),
    (10, 100, 4),
    (100, 10**3, 26),
    (10**3, 10**4, 18),
    (10**4, 10**5, 12),
    (10**5, 10**6, 5),
    (10**6, 10**7, 5),
    (10**7, 10**8, 2),
]


@dataclass(frozen=True)
class MetricSpec:
    """One synthetic metric: identity + generation parameters."""

    metric_id: int
    name: str
    range_card: int  # configured (paper-scale) value-range cardinality
    gen_range: int  # actual generation range after value_cap
    participation: float  # fraction of the user universe with a row per day
    pareto_a: float  # Lomax shape; larger = values more concentrated near 0

    @property
    def range_class(self) -> tuple[int, int]:
        """The Table 3 class (lo, hi] this spec's configured range is in."""
        for lo, hi, _ in TABLE3_CLASSES:
            if lo < self.range_card <= hi:
                return (lo, hi)
        raise ValueError(f"range_card {self.range_card} out of Table 3 classes")


def core_metrics_105(
    *, value_cap: int = 1 << 20, seed: int = 105
) -> list[MetricSpec]:
    """The 105-core-metric catalog matching Table 3's class counts.

    Range cardinality is drawn log-uniform inside each class;
    participation is drawn so that bigger-range metrics (engagement
    counters, durations) tend to have more rows, mimicking §3.5's
    Pareto observation.
    """
    g = np.random.default_rng(seed)
    specs: list[MetricSpec] = []
    mid = 1
    for lo, hi, count in TABLE3_CLASSES:
        for _ in range(count):
            rc = int(np.ceil(np.exp(g.uniform(np.log(max(lo, 1)), np.log(hi)))))
            rc = max(lo + 1, min(rc, hi))
            # §3.5 economics: small-range metrics (flags, tiny counts)
            # cover most active users; wide-range counters cover small
            # cohorts — participation decays with the range class.
            damp = (10.0 / max(rc, 10)) ** 0.18
            participation = float(np.clip(g.beta(1.6, 2.2) * damp, 0.01, 0.95))
            specs.append(
                MetricSpec(
                    metric_id=mid,
                    name=f"core_{mid:03d}_rc{rc}",
                    range_card=rc,
                    gen_range=min(rc, value_cap),
                    participation=participation,
                    pareto_a=float(g.uniform(0.8, 2.0)),
                )
            )
            mid += 1
    assert len(specs) == 105
    return specs


def table3_histogram(specs: list[MetricSpec]) -> list[tuple[str, int, float]]:
    """Rows of Table 3 for a catalog: (class label, count, proportion)."""
    out = []
    for lo, hi, _ in TABLE3_CLASSES:
        n = sum(1 for s in specs if s.range_class == (lo, hi))
        out.append((f"({lo}, {hi}]", n, n / len(specs)))
    return out


# Table 5 "typical metrics", rows scaled x1e-3 from the paper.
# Paper: A = 316M rows, range (0,1];  B = 34M rows, (0,50];
#        C = 510M rows, (0,21600] (seconds in 6h — a stay-time metric).
TYPICAL_ABC: dict[str, MetricSpec] = {
    "A": MetricSpec(
        metric_id=1001, name="typical_A_binary", range_card=1, gen_range=1,
        participation=316_000 / 600_000, pareto_a=1.2,
    ),
    "B": MetricSpec(
        metric_id=1002, name="typical_B_count", range_card=50, gen_range=50,
        participation=34_000 / 600_000, pareto_a=1.2,
    ),
    "C": MetricSpec(
        metric_id=1003, name="typical_C_staytime", range_card=21_600, gen_range=21_600,
        participation=510_000 / 600_000, pareto_a=1.2,
    ),
}
TYPICAL_UNIVERSE = 600_000  # user universe the A/B/C participations refer to
