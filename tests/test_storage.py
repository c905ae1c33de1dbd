"""Storage accounting (§6.1 / Table 4): formats, sizes, compression."""
import numpy as np
import pytest

from repro.bsi.bsi import BSI
from repro.platform import storage as ST


def test_normal_buffer_is_18_bytes_per_row():
    n = 1000
    buf = ST.normal_buffer(
        np.zeros(n), np.ones(n), np.ones(n), np.arange(n), np.arange(n)
    )
    assert len(buf) == n * ST.NORMAL_ROW_BYTES


def test_compression_reduces_redundant_buffer():
    n = 100_000
    buf = ST.normal_buffer(
        np.zeros(n), np.full(n, 7), np.full(n, 42), np.arange(n),
        np.ones(n),  # constant value column compresses well
    )
    c = ST.compressed_size(buf)
    assert c < len(buf) * 0.7


def test_bsi_blob_smaller_than_normal_for_dense_binary():
    """A dense binary metric: BSI must crush the 18-byte/row format."""
    n = 50_000
    pos = np.arange(n, dtype=np.uint32)
    b = BSI.from_arrays(pos, np.ones(n, dtype=np.uint64))
    normal = n * ST.NORMAL_ROW_BYTES
    assert b.nbytes() < normal / 50


def test_bsi_already_compressed():
    """§6.1: BSI original size ~= compressed size (paper: 1.7 vs 1.6 TB)."""
    g = np.random.default_rng(0)
    pos = np.arange(60_000, dtype=np.uint32)
    vals = (g.pareto(1.2, 60_000) * 50).astype(np.uint64) + 1
    blob = BSI.from_arrays(pos, vals).serialize()
    ratio = ST.compressed_size(blob) / len(blob)
    assert ratio > 0.55  # little left for LZ4 to remove


def test_storage_stats_accumulate():
    s = ST.StorageStats("normal")
    s.add(10, b"x" * 180)
    s.add_sizes(5, 90, 40)
    assert s.rows == 15
    assert s.original_bytes == 270
    assert s.compressed_bytes > 40


def test_codec_available():
    # pyarrow's lz4 should be present; record whichever is in use
    assert ST.CODEC_NAME in ("lz4", "zlib-1")
    assert ST.compressed_size(b"\x00" * 4096) < 256
