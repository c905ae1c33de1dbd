"""Table 6 — average single-core time to sum each user's values over
two days: normal format vs BSI format, metrics A/B/C.

Paper: A 59.2s/0.6s, B 7.3s/1.3s, C 94.3s/10.5s (normal/BSI).

Usage: python jobs/table6_compute_time.py [n_users] [repeats]
"""
import sys
import time

from _session import hr


def _avg(fn, arg, repeats: int) -> float:
    fn(arg)  # warm
    t0 = time.perf_counter()
    for _ in range(repeats):
        fn(arg)
    return (time.perf_counter() - t0) / repeats


def run(n_users: int | None = None, repeats: int = 10):
    from repro.core.evaluation import table6_run_bsi, table6_run_normal, table56_build
    from repro.core.metrics105 import TYPICAL_UNIVERSE

    n_users = n_users or TYPICAL_UNIVERSE
    data = table56_build(n_users=n_users)
    hr(f"Table 6: two-day per-user sum, single core (n_users={n_users:,}, {repeats} repeats)")
    print(f"{'Metric':>6} | {'Normal':>12} | {'BSI':>12} | {'Speedup':>8} | paper speedup")
    paper = {"A": 59.2 / 0.6, "B": 7.3 / 1.3, "C": 94.3 / 10.5}
    out = {}
    for name in "ABC":
        tn = _avg(table6_run_normal, data[name], repeats)
        tb = _avg(table6_run_bsi, data[name], repeats)
        out[name] = (tn, tb)
        print(
            f"{name:>6} | {tn * 1e3:>9.1f} ms | {tb * 1e3:>9.1f} ms | "
            f"{tn / tb:>7.1f}x | {paper[name]:.1f}x"
        )
    return out


if __name__ == "__main__":
    args = [int(a) for a in sys.argv[1:3]]
    run(*args)
