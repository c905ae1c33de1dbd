"""Storage-format accounting for Table 4 (§6.1).

The paper compares a month of the 105 core metrics in two layouts:

- **normal**: fixed-width rows (segment-id UInt16, date UInt32,
  metric-id UInt32, user-id UInt32, value UInt32) = 18 bytes/row;
- **BSI**: one row per (segment, date, metric) with the value column
  as a BSI blob; the keys are 10 bytes, the blob is the serialized
  roaring-sliced index.

"Original size" is the raw buffer; "compressed" is LZ4 over the same
buffer (pyarrow codec; zlib-1 fallback recorded in the result). The
paper's observation under test: the BSI original size ~= its
compressed size (it is already a compressed format), and both are far
below the normal format's.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

try:  # LZ4 exactly as in the paper, via pyarrow
    import pyarrow as pa

    _CODEC = pa.Codec("lz4")
    CODEC_NAME = "lz4"
except Exception:  # pragma: no cover - fallback for exotic builds
    import zlib

    class _ZlibCodec:
        @staticmethod
        def compress(buf):
            return zlib.compress(bytes(buf), level=1)

    _CODEC = _ZlibCodec()
    CODEC_NAME = "zlib-1"

NORMAL_ROW_BYTES = 2 + 4 + 4 + 4 + 4  # §6.1 normal schema
BSI_KEY_BYTES = 2 + 4 + 4  # segment UInt16, date UInt32, metric UInt32


def compressed_size(buf: bytes) -> int:
    """LZ4-compressed byte count of a buffer."""
    out = _CODEC.compress(buf)
    try:
        return out.size  # pyarrow.Buffer
    except AttributeError:
        return len(out)


def normal_buffer(
    segment_ids: np.ndarray,
    dates: np.ndarray,
    metric_ids: np.ndarray,
    user_ids: np.ndarray,
    values: np.ndarray,
) -> bytes:
    """Columnar fixed-width buffer of normal-format rows (the layout a
    columnar store compresses), 18 bytes per row total."""
    return b"".join(
        (
            np.asarray(segment_ids, dtype=np.uint16).tobytes(),
            np.asarray(dates, dtype=np.uint32).tobytes(),
            np.asarray(metric_ids, dtype=np.uint32).tobytes(),
            np.asarray(user_ids, dtype=np.uint32).tobytes(),
            np.asarray(values, dtype=np.uint32).tobytes(),
        )
    )


@dataclass
class StorageStats:
    """One Table 4 line: row count + original/compressed byte sizes."""

    fmt: str
    rows: int = 0
    original_bytes: int = 0
    compressed_bytes: int = 0

    def add(self, rows: int, buf: bytes) -> None:
        self.rows += rows
        self.original_bytes += len(buf)
        self.compressed_bytes += compressed_size(buf)

    def add_sizes(self, rows: int, original: int, compressed: int) -> None:
        self.rows += rows
        self.original_bytes += original
        self.compressed_bytes += compressed
