"""TLX-style B+tree and Prefix B+tree substrates (paper §5).

``BPlusTree`` models the TLX (formerly STX) B+tree the paper uses:
fixed 256-byte nodes with fanout 16 — each slot is an 8-byte key
pointer + 8-byte value pointer, variable-length string keys live
outside the node ("reference pointers"). Memory is therefore::

    256 * num_nodes + sum(len(key) for distinct stored keys)

Inner separators are references to existing key strings (no extra key
bytes), matching the TLX string configuration.

``PrefixBPlusTree`` models Bayer/Unterauer prefix truncation + suffix
truncation [16, 25]: a leaf stores its keys' common prefix once and
only suffixes per slot; inner separators are the shortest strings that
separate adjacent leaves (materialised, so their bytes are counted).
Lookup compares the query against the stored prefix once, then only
suffix bytes — the string-comparison speedup HOPE compounds with.

Both trees support point lookup, ordered range scans via leaf links,
and single-key inserts with node splits. Keys are ``bytes``; values
are opaque (8-byte pointers in the memory model).
"""
from __future__ import annotations

from bisect import bisect_left, bisect_right
from typing import Any, List, Optional, Sequence, Tuple

NODE_BYTES = 256
FANOUT = 16


class _Leaf:
    __slots__ = ("keys", "vals", "next")

    def __init__(self) -> None:
        self.keys: List[bytes] = []
        self.vals: List[Any] = []
        self.next: Optional["_Leaf"] = None


class _Inner:
    __slots__ = ("keys", "children")

    def __init__(self) -> None:
        self.keys: List[bytes] = []  # separators; children[i] holds keys < keys[i]
        self.children: List[Any] = []


class BPlusTree:
    """Plain B+tree, full keys stored out-of-node by reference."""

    def __init__(self) -> None:
        self.root: Any = _Leaf()
        self.n_keys = 0

    # -- bulk load -------------------------------------------------------
    def build(self, keys: Sequence[bytes], values: Optional[Sequence[Any]] = None) -> None:
        """Bulk-load sorted unique keys at ~87% fill (14/16 slots)."""
        if values is None:
            values = list(range(len(keys)))
        fill = FANOUT - 2
        leaves: List[_Leaf] = []
        for i in range(0, len(keys), fill):
            leaf = _Leaf()
            leaf.keys = list(keys[i : i + fill])
            leaf.vals = list(values[i : i + fill])
            if leaves:
                leaves[-1].next = leaf
            leaves.append(leaf)
        self.n_keys = len(keys)
        if not leaves:
            self.root = _Leaf()
            return
        level: List[Any] = leaves
        while len(level) > 1:
            parents: List[_Inner] = []
            for i in range(0, len(level), fill):
                node = _Inner()
                group = level[i : i + fill]
                node.children = group
                node.keys = [self._min_key(c) for c in group[1:]]
                parents.append(node)
            level = parents
        self.root = level[0]

    @staticmethod
    def _min_key(node: Any) -> bytes:
        while isinstance(node, _Inner):
            node = node.children[0]
        return node.keys[0]

    # -- queries ---------------------------------------------------------
    def _find_leaf(self, key: bytes) -> _Leaf:
        node = self.root
        while isinstance(node, _Inner):
            node = node.children[bisect_right(node.keys, key)]
        return node

    def lookup(self, key: bytes) -> Optional[Any]:
        leaf = self._find_leaf(key)
        i = bisect_left(leaf.keys, key)
        if i < len(leaf.keys) and leaf.keys[i] == key:
            return leaf.vals[i]
        return None

    def scan(self, start: bytes, count: int) -> List[Tuple[bytes, Any]]:
        leaf = self._find_leaf(start)
        out: List[Tuple[bytes, Any]] = []
        i = bisect_left(leaf.keys, start)
        while leaf is not None and len(out) < count:
            while i < len(leaf.keys) and len(out) < count:
                out.append((leaf.keys[i], leaf.vals[i]))
                i += 1
            leaf = leaf.next
            i = 0
        return out

    # -- insert ----------------------------------------------------------
    def insert(self, key: bytes, value: Any) -> None:
        split = self._insert(self.root, key, value)
        if split is not None:
            sep, right = split
            new_root = _Inner()
            new_root.keys = [sep]
            new_root.children = [self.root, right]
            self.root = new_root

    def _insert(self, node: Any, key: bytes, value: Any):
        if isinstance(node, _Leaf):
            i = bisect_left(node.keys, key)
            if i < len(node.keys) and node.keys[i] == key:
                node.vals[i] = value
                return None
            node.keys.insert(i, key)
            node.vals.insert(i, value)
            self.n_keys += 1
            if len(node.keys) > FANOUT:
                mid = len(node.keys) // 2
                right = _Leaf()
                right.keys = node.keys[mid:]
                right.vals = node.vals[mid:]
                node.keys = node.keys[:mid]
                node.vals = node.vals[:mid]
                right.next = node.next
                node.next = right
                return (right.keys[0], right)
            return None
        i = bisect_right(node.keys, key)
        split = self._insert(node.children[i], key, value)
        if split is None:
            return None
        sep, right = split
        node.keys.insert(i, sep)
        node.children.insert(i + 1, right)
        if len(node.children) > FANOUT:
            mid = len(node.children) // 2
            r = _Inner()
            r.keys = node.keys[mid:]
            r.children = node.children[mid:]
            up = node.keys[mid - 1]
            node.keys = node.keys[: mid - 1]
            node.children = node.children[:mid]
            return (up, r)
        return None

    # -- accounting ------------------------------------------------------
    def _walk_nodes(self):
        stack = [self.root]
        while stack:
            n = stack.pop()
            yield n
            if isinstance(n, _Inner):
                stack.extend(n.children)

    def memory_bytes(self) -> int:
        nodes = 0
        key_bytes = 0
        for n in self._walk_nodes():
            nodes += 1
            if isinstance(n, _Leaf):
                key_bytes += sum(len(k) for k in n.keys)
        return nodes * NODE_BYTES + key_bytes

    def __len__(self) -> int:
        return self.n_keys


class PrefixBPlusTree(BPlusTree):
    """B+tree with per-leaf prefix truncation and suffix-truncated separators.

    Structure and query results are identical to ``BPlusTree``; what
    changes is (a) the memory model — leaf key bytes are charged as
    ``len(leaf_lcp) + sum(len(suffixes))`` and inner separators are
    materialised shortest separators — and (b) lookup's comparison
    pattern, which short-circuits on the stored leaf prefix.
    """

    @staticmethod
    def _lcp_of(keys: Sequence[bytes]) -> bytes:
        if not keys:
            return b""
        lo, hi = keys[0], keys[-1]
        n = min(len(lo), len(hi))
        i = 0
        while i < n and lo[i] == hi[i]:
            i += 1
        return lo[:i]

    @staticmethod
    def shortest_separator(left_max: bytes, right_min: bytes) -> bytes:
        """Shortest prefix of ``right_min`` strictly greater than ``left_max``."""
        i = 0
        n = min(len(left_max), len(right_min))
        while i < n and left_max[i] == right_min[i]:
            i += 1
        return right_min[: i + 1] if i < len(right_min) else right_min

    def lookup(self, key: bytes) -> Optional[Any]:
        leaf = self._find_leaf(key)
        prefix = self._lcp_of(leaf.keys)
        if prefix and not key.startswith(prefix):
            return None  # prefix mismatch decided without touching slots
        i = bisect_left(leaf.keys, key)
        if i < len(leaf.keys) and leaf.keys[i] == key:
            return leaf.vals[i]
        return None

    def memory_bytes(self) -> int:
        nodes = 0
        key_bytes = 0
        for n in self._walk_nodes():
            nodes += 1
            if isinstance(n, _Leaf):
                prefix = self._lcp_of(n.keys)
                key_bytes += len(prefix) + sum(len(k) - len(prefix) for k in n.keys)
            else:
                prev_child_max = None
                for j, sep in enumerate(n.keys):
                    left_max = self._max_key(n.children[j])
                    key_bytes += len(self.shortest_separator(left_max, sep))
        return nodes * NODE_BYTES + key_bytes

    @staticmethod
    def _max_key(node: Any) -> bytes:
        while isinstance(node, _Inner):
            node = node.children[-1]
        return node.keys[-1] if node.keys else b""
