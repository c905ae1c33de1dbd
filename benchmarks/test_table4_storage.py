"""Table 4 — storage of the 105 core metrics over a month, normal vs
BSI format. The benchmark times the end-to-end format build; the sizes
(the actual Table 4 numbers) land in ``extra_info`` and are printed.

Paper (105 metrics x 29 days, production scale):
    Normal: 890e9 rows, 4.1 TB LZ4, 15.6 TB original
    BSI:    3.1e6 rows, 1.6 TB LZ4,  1.7 TB original
"""
import pytest

from repro.core.evaluation import table4_storage

SCALE = dict(n_users=30_000, n_days=29, n_segments=4)


@pytest.mark.benchmark(group="table4")
def test_table4_storage_formats(benchmark):
    result = benchmark.pedantic(
        lambda: table4_storage(**SCALE), rounds=1, iterations=1
    )
    n, b = result.normal, result.bsi
    benchmark.extra_info.update(
        {
            "codec": result.codec,
            "normal_rows": n.rows,
            "normal_original_mb": round(n.original_bytes / 1e6, 1),
            "normal_lz4_mb": round(n.compressed_bytes / 1e6, 1),
            "bsi_rows": b.rows,
            "bsi_original_mb": round(b.original_bytes / 1e6, 1),
            "bsi_lz4_mb": round(b.compressed_bytes / 1e6, 1),
        }
    )
    print("\nTable 4 (paper: Normal 890e9 rows/4.1TB/15.6TB; BSI 3.1e6 rows/1.6TB/1.7TB)")
    for fmt, rows, comp, orig in result.rows():
        print(
            f"  {fmt:6s} rows={rows:>12,}  lz4={comp / 1e6:8.1f} MB  "
            f"original={orig / 1e6:8.1f} MB"
        )
    assert b.original_bytes < n.original_bytes
    assert b.compressed_bytes < n.compressed_bytes
