"""Tests for the B+tree / Prefix B+tree substrates (trees/bplustree.py)."""
import random

import pytest

from repro.trees.bplustree import FANOUT, NODE_BYTES, BPlusTree, PrefixBPlusTree


def _keys(n, seed=0, lo=97, hi=123, minlen=3, maxlen=14):
    rng = random.Random(seed)
    out = set()
    while len(out) < n:
        out.add(bytes(rng.randrange(lo, hi) for _ in range(rng.randrange(minlen, maxlen))))
    return sorted(out)


@pytest.fixture(scope="module", params=[BPlusTree, PrefixBPlusTree], ids=["btree", "prefixbtree"])
def loaded(request):
    keys = _keys(2000, seed=1)
    t = request.param()
    t.build(keys, list(range(len(keys))))
    return t, keys


class TestLookup:
    def test_all_present(self, loaded):
        t, keys = loaded
        for i in range(0, len(keys), 13):
            assert t.lookup(keys[i]) == i

    def test_absent(self, loaded):
        t, keys = loaded
        present = set(keys)
        rng = random.Random(5)
        for _ in range(300):
            k = bytes(rng.randrange(97, 123) for _ in range(6))
            if k not in present:
                assert t.lookup(k) is None

    def test_empty_tree(self):
        t = BPlusTree()
        t.build([], [])
        assert t.lookup(b"x") is None
        assert t.scan(b"", 5) == []


class TestScan:
    def test_matches_reference(self, loaded):
        t, keys = loaded
        rng = random.Random(7)
        for _ in range(100):
            start = bytes(rng.randrange(97, 123) for _ in range(4))
            got = [k for k, _ in t.scan(start, 25)]
            exp = [k for k in keys if k >= start][:25]
            assert got == exp

    def test_scan_from_start(self, loaded):
        t, keys = loaded
        assert [k for k, _ in t.scan(b"", 10)] == keys[:10]

    def test_scan_past_end(self, loaded):
        t, keys = loaded
        assert t.scan(b"\xff\xff", 10) == []

    def test_scan_crosses_leaves(self, loaded):
        t, keys = loaded
        got = [k for k, _ in t.scan(keys[0], 100)]
        assert got == keys[:100]


class TestInsert:
    @pytest.mark.parametrize("cls", [BPlusTree, PrefixBPlusTree])
    def test_incremental_build_matches_bulk(self, cls):
        keys = _keys(800, seed=2)
        t = cls()
        order = list(keys)
        random.Random(3).shuffle(order)
        for i, k in enumerate(order):
            t.insert(k, k)
        assert len(t) == len(keys)
        for k in keys:
            assert t.lookup(k) == k
        assert [k for k, _ in t.scan(b"", len(keys))] == keys

    @pytest.mark.parametrize("cls", [BPlusTree, PrefixBPlusTree])
    def test_update_existing(self, cls):
        t = cls()
        t.build([b"a", b"b"], [1, 2])
        t.insert(b"a", 99)
        assert t.lookup(b"a") == 99
        assert len(t) == 2

    @pytest.mark.parametrize("cls", [BPlusTree, PrefixBPlusTree])
    def test_insert_into_bulk_loaded(self, cls):
        keys = _keys(500, seed=4)
        t = cls()
        t.build(keys, list(range(len(keys))))
        extra = _keys(200, seed=9, lo=65, hi=91)
        for k in extra:
            t.insert(k, k)
        for k in extra:
            assert t.lookup(k) == k
        for i in range(0, len(keys), 17):
            assert t.lookup(keys[i]) == i


class TestMemory:
    def test_node_budget(self, loaded):
        t, keys = loaded
        mem = t.memory_bytes()
        min_leaves = (len(keys) + FANOUT - 1) // FANOUT
        assert mem >= min_leaves * NODE_BYTES

    def test_prefix_tree_not_larger(self):
        # shared-prefix keys: prefix truncation must save bytes
        keys = sorted(b"com.gmail@user%05d" % i for i in range(1000))
        plain = BPlusTree()
        plain.build(keys)
        pfx = PrefixBPlusTree()
        pfx.build(keys)
        assert pfx.memory_bytes() < plain.memory_bytes()

    def test_memory_grows_with_keys(self):
        a, b = BPlusTree(), BPlusTree()
        a.build(_keys(100, seed=1))
        b.build(_keys(1000, seed=1))
        assert b.memory_bytes() > a.memory_bytes()


class TestSeparators:
    def test_shortest_separator(self):
        f = PrefixBPlusTree.shortest_separator
        assert f(b"apple", b"banana") == b"b"
        assert f(b"abc", b"abd") == b"abd"
        assert f(b"ab", b"abc") == b"abc"
        assert len(f(b"carrot", b"carrx")) == 5

    def test_separator_orders_between(self):
        f = PrefixBPlusTree.shortest_separator
        for a, b in [(b"apple", b"banana"), (b"aa", b"ab"), (b"x", b"xa")]:
            sep = f(a, b)
            assert a < sep <= b
