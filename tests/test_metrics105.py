"""The 105-core-metric catalog must reproduce Table 3 by construction."""
import numpy as np
import pytest

from repro.core import metrics105 as M


@pytest.fixture(scope="module")
def specs():
    return M.core_metrics_105()


def test_exactly_105(specs):
    assert len(specs) == 105
    assert len({s.metric_id for s in specs}) == 105


def test_table3_class_counts(specs):
    hist = M.table3_histogram(specs)
    paper = [(f"({lo}, {hi}]", n) for lo, hi, n in M.TABLE3_CLASSES]
    assert [(label, n) for label, n, _ in hist] == paper


def test_table3_proportions_sum_to_one(specs):
    hist = M.table3_histogram(specs)
    assert sum(p for _, _, p in hist) == pytest.approx(1.0)


def test_gen_range_capped(specs):
    for s in specs:
        assert 1 <= s.gen_range <= min(s.range_card, 1 << 20)
        assert s.gen_range <= s.range_card


def test_participation_sane(specs):
    for s in specs:
        assert 0.0 < s.participation < 1.0


def test_deterministic():
    a = M.core_metrics_105()
    b = M.core_metrics_105()
    assert a == b


def test_typical_abc_shapes():
    A, B, C = (M.TYPICAL_ABC[k] for k in "ABC")
    assert A.gen_range == 1  # (0, 1]
    assert B.gen_range == 50  # (0, 50]
    assert C.gen_range == 21_600  # (0, 21600]
    n = M.TYPICAL_UNIVERSE
    # paper's scaled row counts: 316k / 34k / 510k per day
    assert round(A.participation * n) == 316_000
    assert round(B.participation * n) == 34_000
    assert round(C.participation * n) == 510_000


def test_range_class_lookup(specs):
    s = specs[0]
    lo, hi = s.range_class
    assert lo < s.range_card <= hi
