"""Deterministic 32-bit hashing for segmentation / bucketing / traffic.

§3.2 requires a hash "independent of the traffic randomization
process"; we get independence between uses by salting one finalizer-
style mixer differently per purpose. All functions are vectorised
numpy over uint32 and reproducible across processes (no PYTHONHASHSEED
dependence), so the DuckDB oracle and the Spark pipeline see identical
assignments.
"""
from __future__ import annotations

import numpy as np

# distinct salts per purpose; arbitrary odd constants
SEGMENT_SALT = 0x9E3779B1
BUCKET_SALT = 0x85EBCA77
TRAFFIC_SALT = 0xC2B2AE3D
ASSIGN_SALT = 0x27D4EB2F


def mix32(x, salt: int) -> np.ndarray:
    """murmur3-finalizer-style avalanche of ``x ^ salt`` (uint32)."""
    x = (np.asarray(x, dtype=np.uint64) ^ np.uint64(salt)) & np.uint64(0xFFFFFFFF)
    x ^= x >> np.uint64(16)
    x = (x * np.uint64(0x85EBCA6B)) & np.uint64(0xFFFFFFFF)
    x ^= x >> np.uint64(13)
    x = (x * np.uint64(0xC2B2AE35)) & np.uint64(0xFFFFFFFF)
    x ^= x >> np.uint64(16)
    return x.astype(np.uint32)


def segment_of(ids, n_segments: int) -> np.ndarray:
    """segment-id = HASH(analysis-unit-id) % n_segments (§3.2)."""
    return (mix32(ids, SEGMENT_SALT) % np.uint32(n_segments)).astype(np.int32)


def bucket_of(ids, n_buckets: int) -> np.ndarray:
    """bucket-id of the randomization unit (§3.3)."""
    return (mix32(ids, BUCKET_SALT) % np.uint32(n_buckets)).astype(np.int32)


def traffic_hash(ids, experiment_id: int) -> np.ndarray:
    """Uniform [0, 10000) draw per (unit, experiment) for traffic %."""
    h = mix32(np.asarray(ids, dtype=np.uint64) * np.uint64(2654435761), TRAFFIC_SALT + experiment_id * 1013904223)
    return (h % np.uint32(10000)).astype(np.int32)


def assign_hash(ids, experiment_id: int, n_arms: int) -> np.ndarray:
    """Arm assignment per (unit, experiment), independent of traffic."""
    h = mix32(np.asarray(ids, dtype=np.uint64) * np.uint64(0x9E3779B9), ASSIGN_SALT + experiment_id * 69069)
    return (h % np.uint32(n_arms)).astype(np.int32)
