"""In-BSI aggregates (sum/count/mean/min/max/median/n-tile) and the
paper's aggregate-functions-over-BSIs (sumBSI/maxBSI/mulBSI/distinctPos)."""
import numpy as np
import pytest

from repro.bsi.bsi import BSI, distinct_pos, max_bsi, mul_bsi, sum_bsi
from tests.test_bsi_arith import as_dict, rand_dict, ref

DICTS = [
    {1: 1},
    {1: 5, 9: 2, 100: 77},
    rand_dict(40, vmax=10),
    rand_dict(41, vmax=1000),
    rand_dict(42, n=3000, vmax=100_000),
    {i: 1 for i in range(1000)},
]


@pytest.mark.parametrize("d", DICTS, ids=range(len(DICTS)))
def test_sum_count_mean_min_max(d):
    b = ref(d)
    vals = list(d.values())
    assert b.sum() == sum(vals)
    assert b.count() == len(vals)
    assert b.mean() == pytest.approx(np.mean(vals))
    assert b.min() == min(vals)
    assert b.max() == max(vals)


@pytest.mark.parametrize("d", DICTS, ids=range(len(DICTS)))
def test_rank_and_quantiles(d):
    b = ref(d)
    svals = sorted(d.values())
    for r in {1, len(svals) // 2 + 1, len(svals)}:
        assert b.rank_value(r) == svals[r - 1]
    assert b.median() == svals[int(np.ceil(0.5 * len(svals))) - 1]
    for q in (0.1, 0.25, 0.75, 0.9, 1.0):
        assert b.quantile(q) == svals[max(1, int(np.ceil(q * len(svals)))) - 1]


def test_sum_filtered():
    d = rand_dict(43)
    keep = {p for p in d if p % 3 == 0}
    from repro.bsi.bitmap import RoaringBitmap

    bm = RoaringBitmap.from_array(np.array(sorted(keep), dtype=np.uint32))
    assert ref(d).sum_filtered(bm) == sum(v for p, v in d.items() if p in keep)


def test_empty_aggregates():
    b = BSI.empty()
    assert b.sum() == 0 and b.count() == 0
    assert np.isnan(b.mean())
    with pytest.raises(ValueError):
        b.min()
    with pytest.raises(ValueError):
        b.quantile(0.5)


def test_sum_bsi_many():
    ds = [rand_dict(s) for s in (50, 51, 52, 53)]
    expect = {}
    for d in ds:
        for p, v in d.items():
            expect[p] = expect.get(p, 0) + v
    assert as_dict(sum_bsi(ref(d) for d in ds)) == expect


def test_max_bsi():
    x, y = rand_dict(54, vmax=100), rand_dict(55, vmax=100)
    expect = {p: max(x.get(p, 0), y.get(p, 0)) for p in set(x) | set(y)}
    assert as_dict(max_bsi(ref(x), ref(y))) == expect


def test_mul_bsi():
    x, y = rand_dict(56, vmax=50), rand_dict(57, vmax=50)
    expect = {p: x[p] * y[p] for p in set(x) & set(y)}
    assert as_dict(mul_bsi(ref(x), ref(y))) == expect


def test_distinct_pos_unique_visitors():
    # the UV-merge pattern from §4.2: s_d = (value_d > 0), UV = |OR s_d|
    days = [rand_dict(s) for s in (60, 61, 62)]
    merged = distinct_pos(ref(d) for d in days)
    assert merged.count() == len(set().union(*days))
    assert merged.sum() == merged.count()  # binary BSI
