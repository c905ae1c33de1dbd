"""Table 3 — value-range-cardinality distribution of the 105 core
metrics. Our catalog reproduces the paper's class counts by
construction; this job prints configured classes plus the realized
one-day cardinalities at a given scale (which a small universe caps).

Usage: python jobs/table3_value_ranges.py [n_users]
"""
import sys

import numpy as np

from _session import hr


def run(n_users: int = 30_000, seed: int = 3) -> list[tuple[str, int, float]]:
    from repro.core.metrics105 import TABLE3_CLASSES, core_metrics_105, table3_histogram
    from repro.platform.genlog import _participating_users, metric_values

    specs = core_metrics_105()
    hist = table3_histogram(specs)
    hr("Table 3: value range cardinalities of the 105 core metrics")
    print(f"{'Range Card (One Day)':>22} | {'Paper':>5} | {'Ours':>5} | {'Proportion':>10}")
    for (label, n, p), (_, _, paper_n) in zip(hist, TABLE3_CLASSES):
        print(f"{label:>22} | {paper_n:>5} | {n:>5} | {p:>9.1%}")

    # realized per-day cardinality at this scale (capped by rows)
    g = np.random.default_rng(seed)
    realized = []
    for spec in specs:
        users = _participating_users(g, n_users, spec.participation)
        vals = metric_values(g, spec, len(users))
        realized.append(len(np.unique(vals)))
    print(
        f"\nrealized one-day cardinality at n_users={n_users:,}: "
        f"median={int(np.median(realized))}, max={max(realized)} "
        "(configured ranges above the row count are capped by the data)"
    )
    return hist


if __name__ == "__main__":
    run(int(sys.argv[1]) if len(sys.argv) > 1 else 30_000)
