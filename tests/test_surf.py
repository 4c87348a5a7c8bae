"""Tests for the SuRF substrate (trees/surf.py)."""
import random

import pytest

from repro.trees.surf import SuRF


def _keys(n, seed=0, minlen=4, maxlen=18):
    rng = random.Random(seed)
    out = set()
    while len(out) < n:
        out.add(bytes(rng.randrange(97, 123) for _ in range(rng.randrange(minlen, maxlen))))
    return sorted(out)


@pytest.fixture(scope="module")
def loaded():
    keys = _keys(3000, seed=1)
    s = SuRF(suffix_bits=8)
    s.build(keys)
    return s, keys


class TestNoFalseNegatives:
    def test_point(self, loaded):
        s, keys = loaded
        assert all(s.may_contain(k) for k in keys)

    def test_range_singleton(self, loaded):
        s, keys = loaded
        for i in range(0, len(keys), 13):
            assert s.may_contain_range(keys[i], keys[i])

    def test_range_spanning(self, loaded):
        s, keys = loaded
        for i in range(0, len(keys) - 10, 37):
            assert s.may_contain_range(keys[i], keys[i + 10])

    @pytest.mark.parametrize("bits", [0, 2, 4, 8])
    def test_no_fn_any_suffix_bits(self, bits):
        keys = _keys(500, seed=3)
        s = SuRF(suffix_bits=bits)
        s.build(keys)
        assert all(s.may_contain(k) for k in keys)


class TestFalsePositives:
    def test_fpr_decreases_with_suffix_bits(self):
        keys = _keys(2000, seed=5)
        present = set(keys)
        rng = random.Random(6)
        negatives = []
        while len(negatives) < 2000:
            k = bytes(rng.randrange(97, 123) for _ in range(rng.randrange(4, 18)))
            if k not in present:
                negatives.append(k)
        fprs = []
        for bits in (0, 2, 4, 8):
            s = SuRF(suffix_bits=bits)
            s.build(keys)
            fprs.append(s.false_positive_rate(negatives))
        assert fprs[0] >= fprs[1] >= fprs[2] >= fprs[3]
        assert fprs[3] < 0.1

    def test_far_negatives_rejected(self, loaded):
        s, _ = loaded
        assert not s.may_contain(b"0123456789")  # digits never loaded
        assert not s.may_contain_range(b"0", b"9")

    def test_empty_range_between_keys(self, loaded):
        s, keys = loaded
        # range strictly between two adjacent truncated keys can still
        # be a (one-sided) True; but a range beyond the last key is False
        assert not s.may_contain_range(b"\xff", b"\xff\xff")


class TestStructure:
    def test_heights_are_unique_prefix_lengths(self):
        keys = [b"apple", b"apply", b"banana"]
        s = SuRF(suffix_bits=0)
        s.build(keys)
        # apple/apply share 4 bytes -> truncated at 5; banana unique at 1
        assert sorted(s._heights) == [1, 5, 5]
        assert s.avg_leaf_depth() == pytest.approx((5 + 5 + 1) / 3)

    def test_prefix_key_flag(self):
        keys = [b"ab", b"abc"]
        s = SuRF(suffix_bits=0)
        s.build(keys)
        assert s.may_contain(b"ab") and s.may_contain(b"abc")

    def test_memory_scales_with_suffix_bits(self):
        keys = _keys(1000, seed=7)
        m = []
        for bits in (0, 4, 8):
            s = SuRF(suffix_bits=bits)
            s.build(keys)
            m.append(s.memory_bytes())
        assert m[0] < m[1] < m[2]
        # suffix bits cost exactly n_keys * bits
        assert (m[2] - m[0]) == pytest.approx(1000, abs=2)

    def test_memory_far_below_raw_keys(self, loaded):
        s, keys = loaded
        assert s.memory_bytes() < sum(map(len, keys))

    def test_len(self, loaded):
        s, keys = loaded
        assert len(s) == len(keys)

    def test_empty_build(self):
        s = SuRF()
        s.build([])
        assert not s.may_contain(b"x")
        assert not s.may_contain_range(b"a", b"z")
