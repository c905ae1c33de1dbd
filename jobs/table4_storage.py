"""Table 4 — storage of the 105 core metrics in a month (29 days),
normal fixed-width format vs BSI format, original and LZ4 sizes.

Paper: Normal 890e9 rows / 4.1 TB LZ4 / 15.6 TB original;
       BSI    3.1e6 rows / 1.6 TB LZ4 /  1.7 TB original.

Usage: python jobs/table4_storage.py [n_users] [n_days] [n_segments]
"""
import sys

from _session import fmt_bytes, hr


def run(n_users: int = 30_000, n_days: int = 29, n_segments: int = 4):
    from repro.core.evaluation import table4_storage

    r = table4_storage(n_users=n_users, n_days=n_days, n_segments=n_segments)
    hr(
        f"Table 4: storage of 105 core metrics over {n_days} days "
        f"(n_users={n_users:,}, {n_segments} segments, codec={r.codec})"
    )
    print(f"{'Format':>8} | {'Rows':>14} | {'Compressed(LZ4)':>16} | {'Original':>10}")
    for fmt, rows, comp, orig in r.rows():
        print(f"{fmt:>8} | {rows:>14,} | {fmt_bytes(comp):>16} | {fmt_bytes(orig):>10}")
    n, b = r.normal, r.bsi
    print(
        f"\nratios: BSI/normal original={b.original_bytes / n.original_bytes:.2f} "
        f"(paper 0.11), BSI/normal LZ4={b.compressed_bytes / n.compressed_bytes:.2f} "
        f"(paper 0.39), BSI LZ4/original={b.compressed_bytes / b.original_bytes:.2f} "
        "(paper 0.94 — already compressed)"
    )
    return r


if __name__ == "__main__":
    args = [int(a) for a in sys.argv[1:4]]
    run(*args)
