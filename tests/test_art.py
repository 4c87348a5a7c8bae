"""Tests for the ART substrate (trees/art.py)."""
import random

import pytest

from repro.trees.art import ART, PESSIMISTIC_BYTES


def _keys(n, seed=0, minlen=2, maxlen=16, alphabet=(97, 123)):
    rng = random.Random(seed)
    out = set()
    while len(out) < n:
        out.add(bytes(rng.randrange(*alphabet) for _ in range(rng.randrange(minlen, maxlen))))
    return sorted(out)


@pytest.fixture(scope="module")
def loaded():
    keys = _keys(2500, seed=1)
    t = ART()
    t.build(keys, list(range(len(keys))))
    return t, keys


class TestLookup:
    def test_all_present(self, loaded):
        t, keys = loaded
        for i in range(0, len(keys), 11):
            assert t.lookup(keys[i]) == i

    def test_absent(self, loaded):
        t, keys = loaded
        present = set(keys)
        rng = random.Random(2)
        miss = 0
        for _ in range(500):
            k = bytes(rng.randrange(97, 123) for _ in range(7))
            if k not in present:
                assert t.lookup(k) is None
                miss += 1
        assert miss > 0

    def test_empty(self):
        assert ART().lookup(b"x") is None

    def test_single_key(self):
        t = ART()
        t.insert(b"hello", 1)
        assert t.lookup(b"hello") == 1
        assert t.lookup(b"hell") is None
        assert t.lookup(b"hello!") is None


class TestPrefixKeys:
    """The paper's first ART modification: prefix-key support."""

    def test_key_prefix_of_another(self):
        t = ART()
        t.insert(b"abc", 1)
        t.insert(b"abcd", 2)
        t.insert(b"ab", 3)
        assert t.lookup(b"abc") == 1
        assert t.lookup(b"abcd") == 2
        assert t.lookup(b"ab") == 3
        assert t.lookup(b"a") is None

    def test_prefix_keys_scan_order(self):
        t = ART()
        keys = [b"a", b"aa", b"aaa", b"ab", b"b"]
        for i, k in enumerate(keys):
            t.insert(k, i)
        assert [k for k, _ in t.scan(b"", 10)] == keys

    def test_empty_suffix_split(self):
        t = ART()
        t.insert(b"test", 1)
        t.insert(b"te", 2)
        assert t.lookup(b"te") == 2
        assert t.lookup(b"test") == 1


class TestPathCompression:
    def test_long_common_prefix_single_node(self):
        t = ART()
        t.insert(b"http://www.example.com/a", 1)
        t.insert(b"http://www.example.com/b", 2)
        # one inner node splitting at the last byte
        assert t.lookup(b"http://www.example.com/a") == 1
        assert t.lookup(b"http://www.example.com/x") is None
        assert t.avg_leaf_depth() == 2.0  # root inner + leaf

    def test_ocps_verifies_at_leaf(self):
        """Keys differing only inside the optimistically-skipped region
        must still resolve correctly (leaf verification)."""
        prefix = b"x" * (PESSIMISTIC_BYTES + 10)
        t = ART()
        t.insert(prefix + b"a_tail1", 1)
        t.insert(prefix + b"b_tail2", 2)
        probe = prefix[:-1] + b"Z" + b"a_tail1"  # differs in skipped zone
        assert t.lookup(probe) is None
        assert t.lookup(prefix + b"a_tail1") == 1


class TestScan:
    def test_matches_reference(self, loaded):
        t, keys = loaded
        rng = random.Random(3)
        for _ in range(100):
            start = bytes(rng.randrange(97, 123) for _ in range(3))
            got = [k for k, _ in t.scan(start, 20)]
            exp = [k for k in keys if k >= start][:20]
            assert got == exp

    def test_scan_all(self, loaded):
        t, keys = loaded
        assert [k for k, _ in t.scan(b"", len(keys) + 5)] == keys

    def test_scan_exact_start(self, loaded):
        t, keys = loaded
        got = [k for k, _ in t.scan(keys[100], 5)]
        assert got == keys[100:105]


class TestInsert:
    def test_random_order_inserts(self):
        keys = _keys(1000, seed=5)
        order = list(keys)
        random.Random(6).shuffle(order)
        t = ART()
        for k in order:
            t.insert(k, k)
        assert len(t) == len(keys)
        for k in keys:
            assert t.lookup(k) == k
        assert [k for k, _ in t.scan(b"", len(keys))] == keys

    def test_update(self):
        t = ART()
        t.insert(b"k", 1)
        t.insert(b"k", 2)
        assert t.lookup(b"k") == 2
        assert len(t) == 1


class TestAccounting:
    def test_leaf_memory_excludes_keys(self):
        """ART leaves are 8-byte record pointers; key bytes live with
        the tuple (paper accounting)."""
        t = ART()
        t.insert(b"a" * 100, 1)
        assert t.memory_bytes() == 8

    def test_adaptive_node_sizes(self):
        # fanout 2 -> Node4-sized; fanout 200 -> Node256-sized
        small, big = ART(), ART()
        for b in (97, 98):
            small.insert(bytes([b]), b)
        for b in range(10, 220):
            big.insert(bytes([b]), b)
        per_child_small = small.memory_bytes() / 2
        per_child_big = big.memory_bytes() / 210
        assert small.memory_bytes() == 16 + 4 + 32 + 2 * 8
        assert big.memory_bytes() == 16 + 256 * 8 + 210 * 8

    def test_height_decreases_with_shared_prefix_removed(self):
        shared = [b"same.prefix.everywhere/" + bytes([b]) for b in range(65, 91)]
        t = ART()
        t.build(shared)
        assert t.avg_leaf_depth() == 2.0  # path compression collapses the prefix
