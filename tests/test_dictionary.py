"""Tests for the Dictionary structures (core/dictionary.py).

The key invariant: every structure answers the same predecessor query
as the sorted-array binary-search baseline, for every scheme's
boundary set — the paper's structures are performance variants of one
abstract dictionary.
"""
import random

import pytest

from repro.core.code_assign import assign_fixed
from repro.core.dictionary import ArrayDict, SortedBoundaryDict, TrieDict
from repro.core.intervals import build_intervals, with_codes
from repro.core.symbol_select import (
    select_alm,
    select_double_char,
    select_grams,
    select_single_char,
)

SAMPLES = [b"com.gmail@alice", b"com.gmail@bob", b"org.wiki@dave", b"net.art@erin"] * 25


def _made(boundaries):
    ivs = build_intervals(boundaries)
    return with_codes(ivs, assign_fixed(len(ivs)))


def _random_keys(n, seed=0, maxlen=20):
    rng = random.Random(seed)
    out = []
    for _ in range(n):
        out.append(bytes(rng.randrange(256) for _ in range(rng.randrange(1, maxlen))))
    out += [b"com.gmail@alice", b"com.x", b"ing", b"\x00", b"\xff\xff\xff\xff"]
    return out


class TestArrayDict:
    def test_single_char_lookup(self):
        ivs = _made(select_single_char(SAMPLES))
        d = ArrayDict(ivs, width=1)
        code, nbits, symlen = d.lookup(b"apple", 0)
        assert symlen == 1
        assert code == 97  # fixed codes are the interval indexes

    def test_double_char_lookup_pair(self):
        ivs = _made(select_double_char(SAMPLES))
        d = ArrayDict(ivs, width=2)
        code, nbits, symlen = d.lookup(b"aa", 0)
        assert symlen == 2
        assert code == 97 * 257 + 1 + 97

    def test_double_char_lookup_terminator(self):
        ivs = _made(select_double_char(SAMPLES))
        d = ArrayDict(ivs, width=2)
        code, nbits, symlen = d.lookup(b"xa", 1)  # one byte left
        assert symlen == 1
        assert code == 97 * 257

    def test_wrong_size_raises(self):
        ivs = _made(select_single_char(SAMPLES))
        with pytest.raises(ValueError):
            ArrayDict(ivs, width=2)

    def test_memory(self):
        ivs = _made(select_single_char(SAMPLES))
        assert ArrayDict(ivs, width=1).memory_bytes() == 256 * 5

    @pytest.mark.parametrize("width,selector", [(1, select_single_char), (2, select_double_char)])
    def test_matches_baseline(self, width, selector):
        ivs = _made(selector(SAMPLES))
        d = ArrayDict(ivs, width=width)
        base = SortedBoundaryDict(ivs)
        for k in _random_keys(300, seed=width):
            for pos in range(min(3, len(k))):
                assert d.lookup(k, pos) == base.lookup(k, pos)


class TestTrieDict:
    @pytest.mark.parametrize(
        "name,boundaries",
        [
            ("3grams", select_grams(SAMPLES, 3, 4096)),
            ("4grams", select_grams(SAMPLES, 4, 4096)),
            ("alm", select_alm(SAMPLES, 1024, improved=False)),
            ("alm-improved", select_alm(SAMPLES, 1024, improved=True)),
        ],
    )
    @pytest.mark.parametrize("model", ["bitmap", "art"])
    def test_matches_baseline(self, name, boundaries, model):
        ivs = _made(boundaries)
        d = TrieDict(ivs, model=model)
        base = SortedBoundaryDict(ivs)
        for k in _random_keys(400, seed=hash(name) % 1000):
            for pos in range(min(3, len(k))):
                assert d.lookup(k, pos) == base.lookup(k, pos), (k, pos)

    def test_duplicate_boundary_raises(self):
        ivs = _made(select_single_char(SAMPLES))
        with pytest.raises(ValueError):
            TrieDict(list(ivs) + [ivs[-1]])

    def test_bitmap_memory_is_36b_per_node(self):
        ivs = _made(select_single_char(SAMPLES))
        d = TrieDict(ivs, model="bitmap")
        # 256 single-byte boundaries -> root + 256 children = 257 nodes
        assert d.memory_bytes() == 257 * 36 + 256 * 5

    def test_art_memory_smaller_than_bitmap_for_sparse(self):
        ivs = _made(select_alm(SAMPLES, 1024, improved=True))
        bitmap = TrieDict(ivs, model="bitmap").memory_bytes()
        art = TrieDict(ivs, model="art").memory_bytes()
        assert art > 0 and bitmap > 0

    def test_invalid_model(self):
        ivs = _made(select_single_char(SAMPLES))
        with pytest.raises(ValueError):
            TrieDict(ivs, model="wat")


class TestSortedBaseline:
    def test_incomplete_raises(self):
        ivs = _made(select_single_char(SAMPLES))[10:]
        d = SortedBoundaryDict(ivs)
        with pytest.raises(KeyError):
            d.lookup(b"\x00", 0)

    def test_len(self):
        ivs = _made(select_single_char(SAMPLES))
        assert len(SortedBoundaryDict(ivs)) == 256

    def test_bitmap_trie_1_4x_of_array(self):
        """Paper §6.1: the 3-Grams bitmap-trie is ~1.4x the Double-Char
        array at the same entry count; we check the same order of
        magnitude (structure-dependent)."""
        ivs3 = _made(select_grams(SAMPLES * 10, 3, 65536))
        trie = TrieDict(ivs3, model="bitmap")
        per_entry_trie = trie.memory_bytes() / len(trie)
        assert per_entry_trie < 5 * 36  # sane: far below one node per entry
