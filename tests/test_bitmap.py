"""Unit tests for RoaringBitmap against python-set semantics."""
import numpy as np
import pytest

from repro.bsi.bitmap import RoaringBitmap

SETS = [
    set(),
    {0},
    {1, 2, 3},
    {65535, 65536, 65537},  # container boundary
    set(range(0, 200_000, 17)),
    set(range(70_000, 75_000)),
    set(range(0, 66_000)),  # one full + one partial container
    {2**32 - 1, 0, 123456789},
    set(np.random.default_rng(7).integers(0, 1 << 20, 5000).tolist()),
]


def mk(s):
    return RoaringBitmap.from_array(np.fromiter(s, dtype=np.uint32, count=len(s)))


@pytest.mark.parametrize("i", range(len(SETS)))
@pytest.mark.parametrize("j", range(len(SETS)))
def test_ops_match_sets(i, j):
    a, b = SETS[i], SETS[j]
    ra, rb = mk(a), mk(b)
    assert set((ra & rb).to_array().tolist()) == (a & b)
    assert set((ra | rb).to_array().tolist()) == (a | b)
    assert set((ra ^ rb).to_array().tolist()) == (a ^ b)
    assert set(ra.andnot(rb).to_array().tolist()) == (a - b)


@pytest.mark.parametrize("i", range(len(SETS)))
def test_roundtrip_and_card(i):
    s = SETS[i]
    r = mk(s)
    assert r.cardinality() == len(s)
    assert set(r.to_array().tolist()) == s
    assert r.to_array().tolist() == sorted(s)  # sorted output


@pytest.mark.parametrize("i", range(len(SETS)))
def test_serde(i):
    r = mk(SETS[i])
    r2 = RoaringBitmap.deserialize(r.serialize())
    assert r == r2
    assert r.nbytes() == len(r.serialize())


@pytest.mark.parametrize("i", range(len(SETS)))
def test_contains_array(i):
    s = SETS[i]
    probes = np.array([0, 1, 65535, 65536, 2**32 - 1, 70_001], dtype=np.uint32)
    got = mk(s).contains_array(probes)
    assert got.tolist() == [int(p) in s for p in probes]


def test_equality_and_copy():
    a = mk(SETS[4])
    b = a.copy()
    assert a == b
    c = b | mk({999_999_999 % (1 << 32)})
    assert a == b and not (a == c)


def test_from_array_dedups():
    r = RoaringBitmap.from_array(np.array([5, 5, 5, 9], dtype=np.uint32))
    assert r.cardinality() == 2


def test_empty():
    e = RoaringBitmap.empty()
    assert not e and len(e) == 0 and e.to_array().size == 0
    assert (e | e) == e and (e & mk({1, 2})) == e
