"""Pre-aggregate tree (Figure 6): correctness and node-count claims."""
import numpy as np
import pytest

from repro.bsi.bsi import BSI, max_bsi
from repro.platform.preagg import PreAggTree
from tests.test_bsi_arith import as_dict, rand_dict, ref


def _days(n, seed0=100):
    return {d: rand_dict(seed0 + d, n=200, vmax=50) for d in range(1, n + 1)}


def _tree(days, **kw):
    return PreAggTree({d: ref(x) for d, x in days.items()}, first_day=1,
                      n_days=len(days), **kw)


@pytest.mark.parametrize("n_days", [1, 2, 5, 7, 8, 13])
def test_full_range_sum(n_days):
    days = _days(n_days)
    got = as_dict(_tree(days).query(1, n_days))
    expect = {}
    for x in days.values():
        for p, v in x.items():
            expect[p] = expect.get(p, 0) + v
    assert got == expect


@pytest.mark.parametrize("lo,hi", [(1, 7), (2, 5), (3, 3), (1, 1), (4, 7)])
def test_partial_ranges(lo, hi):
    days = _days(7)
    got = as_dict(_tree(days).query(lo, hi))
    expect = {}
    for d in range(lo, hi + 1):
        for p, v in days[d].items():
            expect[p] = expect.get(p, 0) + v
    assert got == expect


def test_paper_example_seven_days_three_nodes():
    """Fig. 6: sumBSI for day 1..7 merges 3 nodes (1234, 56, 7)."""
    t = _tree(_days(7))
    assert t.nodes_merged(1, 7) == 3


@pytest.mark.parametrize("lo,hi,naive", [(1, 7, 7), (1, 4, 4), (2, 7, 6)])
def test_fewer_merges_than_naive(lo, hi, naive):
    t = _tree(_days(8))
    assert t.nodes_merged(lo, hi) <= max(1, 2 * int(np.ceil(np.log2(naive))) )
    assert t.nodes_merged(lo, hi) <= naive


def test_out_of_range_raises():
    t = _tree(_days(5))
    with pytest.raises(ValueError):
        t.query(0, 3)
    with pytest.raises(ValueError):
        t.query(2, 6)


def test_missing_days_are_empty():
    days = {1: rand_dict(201), 3: rand_dict(202)}  # day 2 missing
    t = PreAggTree({d: ref(x) for d, x in days.items()}, first_day=1, n_days=3)
    got = as_dict(t.query(1, 3))
    expect = {}
    for x in days.values():
        for p, v in x.items():
            expect[p] = expect.get(p, 0) + v
    assert got == expect
    assert as_dict(t.query(2, 2)) == {}


def test_custom_combine_max():
    days = _days(4)
    t = _tree(days, combine=max_bsi)
    got = as_dict(t.query(1, 4))
    expect = {}
    for x in days.values():
        for p, v in x.items():
            expect[p] = max(expect.get(p, 0), v)
    assert got == expect
