"""Property-based fuzzing of bitmap and BSI ops with hypothesis."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.bsi.bitmap import RoaringBitmap
from repro.bsi.bsi import BSI

pos_sets = st.sets(st.integers(0, 1 << 18), max_size=300)
val_dicts = st.dictionaries(st.integers(0, 1 << 18), st.integers(1, 1 << 20), max_size=120)


def mk(s):
    return RoaringBitmap.from_array(np.array(sorted(s), dtype=np.uint32))


def mkb(d):
    ks = sorted(d)
    return BSI.from_arrays(
        np.array(ks, dtype=np.uint32), np.array([d[k] for k in ks], dtype=np.uint64)
    )


@settings(max_examples=150, deadline=None)
@given(pos_sets, pos_sets)
def test_bitmap_ops(a, b):
    ra, rb = mk(a), mk(b)
    assert set((ra & rb).to_array().tolist()) == a & b
    assert set((ra | rb).to_array().tolist()) == a | b
    assert set((ra ^ rb).to_array().tolist()) == a ^ b
    assert set(ra.andnot(rb).to_array().tolist()) == a - b
    assert RoaringBitmap.deserialize(ra.serialize()) == ra


@settings(max_examples=100, deadline=None)
@given(val_dicts, val_dicts)
def test_bsi_add_and_compare(x, y):
    bx, by = mkb(x), mkb(y)
    s = bx.add(by)
    pos, vals = s.to_arrays()
    got = dict(zip(pos.tolist(), vals.tolist()))
    assert got == {p: x.get(p, 0) + y.get(p, 0) for p in set(x) | set(y)}
    common = set(x) & set(y)
    assert set(bx.lt(by).to_array().tolist()) == {p for p in common if x[p] < y[p]}
    assert set(bx.eq(by).to_array().tolist()) == {p for p in common if x[p] == y[p]}
    assert set(bx.ne(by).to_array().tolist()) == {p for p in common if x[p] != y[p]}


@settings(max_examples=100, deadline=None)
@given(val_dicts, st.integers(0, 1 << 21))
def test_bsi_const_predicates(x, k):
    bx = mkb(x)
    assert set(bx.le_const(k).to_array().tolist()) == {p for p, v in x.items() if v <= k}
    assert set(bx.gt_const(k).to_array().tolist()) == {p for p, v in x.items() if v > k}
    assert set(bx.eq_const(k).to_array().tolist()) == {p for p, v in x.items() if v == k}


@settings(max_examples=100, deadline=None)
@given(val_dicts)
def test_bsi_aggregates_and_serde(x):
    bx = mkb(x)
    assert bx.sum() == sum(x.values())
    assert bx.count() == len(x)
    if x:
        assert bx.min() == min(x.values())
        assert bx.max() == max(x.values())
        assert bx.median() == sorted(x.values())[int(np.ceil(0.5 * len(x))) - 1]
    assert BSI.deserialize(bx.serialize()) == bx
