"""Table 5 — the three typical metrics A/B/C in one day: rows,
normal-format size and value range, scaled x1e-3 in rows from the
paper (A 316M/140MB/(0,1], B 34M/86MB/(0,50], C 510M/2GB/(0,21600]).

Usage: python jobs/table5_metric_details.py [n_users]
"""
import sys

from _session import fmt_bytes, hr

PAPER = {"A": ("316 million", "140 MB", "(0, 1]"),
         "B": ("34 million", "86 MB", "(0, 50]"),
         "C": ("510 million", "2 GB", "(0, 21600]")}


def run(n_users: int | None = None):
    from repro.core.evaluation import table56_build
    from repro.core.metrics105 import TYPICAL_UNIVERSE

    n_users = n_users or TYPICAL_UNIVERSE
    data = table56_build(n_users=n_users)
    hr(f"Table 5: three typical metrics in one day (n_users={n_users:,})")
    print(f"{'Metric':>6} | {'Rows':>10} | {'Original Size':>13} | {'Value Range':>12} | paper: rows/size")
    for name in "ABC":
        d = data[name]
        pr, ps, _ = PAPER[name]
        print(
            f"{name:>6} | {d.rows:>10,} | {fmt_bytes(d.original_bytes):>13} | "
            f"(0, {d.value_range}] | {pr} / {ps}"
        )
    return data


if __name__ == "__main__":
    run(int(sys.argv[1]) if len(sys.argv) > 1 else None)
