"""Determinism and balance of the segmentation/bucketing hashes."""
import numpy as np
import pytest

from repro.platform import hashing as H

IDS = np.arange(1, 100_001)


def test_segment_deterministic():
    a = H.segment_of(IDS, 1024)
    b = H.segment_of(IDS, 1024)
    assert np.array_equal(a, b)


@pytest.mark.parametrize("n", [8, 64, 1024])
def test_segment_balance(n):
    seg = H.segment_of(IDS, n)
    counts = np.bincount(seg, minlength=n)
    assert counts.min() > 0
    assert counts.max() / counts.mean() < 1.5


@pytest.mark.parametrize("n", [8, 64, 1024])
def test_bucket_balance(n):
    buck = H.bucket_of(IDS, n)
    counts = np.bincount(buck, minlength=n)
    assert counts.max() / counts.mean() < 1.5


@pytest.mark.parametrize("n", [4, 16])
def test_bucket_independent_of_segment(n):
    # joint distribution ~ uniform over n*n cells (cells >> 1 sample each)
    seg = H.segment_of(IDS, n)
    buck = H.bucket_of(IDS, n)
    joint = np.bincount(seg * n + buck, minlength=n * n)
    assert joint.max() / joint.mean() < 1.5


def test_traffic_split_fraction():
    h = H.traffic_hash(IDS, experiment_id=5)
    frac = (h < 3000).mean()
    assert abs(frac - 0.30) < 0.01


def test_traffic_independent_between_experiments():
    in1 = H.traffic_hash(IDS, 1) < 5000
    in2 = H.traffic_hash(IDS, 2) < 5000
    overlap = (in1 & in2).mean()
    assert abs(overlap - 0.25) < 0.01


@pytest.mark.parametrize("arms", [2, 3])
def test_assignment_balanced(arms):
    a = H.assign_hash(IDS, 1, arms)
    counts = np.bincount(a, minlength=arms)
    assert counts.max() / counts.mean() < 1.05


def test_assignment_independent_of_traffic():
    enrolled = H.traffic_hash(IDS, 1) < 5000
    arms = H.assign_hash(IDS, 1, 2)
    frac_in = arms[enrolled].mean()
    frac_out = arms[~enrolled].mean()
    assert abs(frac_in - frac_out) < 0.02
