"""Height Optimized Trie (HOT) substrate [18] (paper §5) — simplified.

HOT's defining ideas, which we keep:

* it stores only the **branching points** of the key set — a binary
  Patricia trie over discriminative bit positions, so non-branching
  key bytes are never stored (maximally "optimistic" partial keys; the
  paper's §7.2 explanation for HOT's diluted HOPE gains);
* binary branching points are **combined across trie levels into
  compound nodes of fanout <= 32**, guaranteeing low height;
* leaves are 8-byte value pointers; full keys live with the record and
  are only used for final verification (counted outside the index).

Simplifications vs. the real C++ HOT (documented in DESIGN.md): the
compound grouping is a greedy top-down packing of up to 5 binary
levels, recomputed after inserts for accounting, and the in-node layout
cost is modelled as 16 B header + 10 B per entry (sparse partial key +
pointer) rather than HOT's bit-packed SIMD layouts.

Keys are expanded 8→9 bits per byte (a leading 1, then the byte) with
a 0-terminator, so prefix keys order correctly and every pair of
distinct keys has a well-defined discriminative bit.
"""
from __future__ import annotations

from typing import Any, Iterator, List, Optional, Sequence, Tuple

MAX_COMPOUND_FANOUT = 32
_COMPOUND_LEVELS = 5  # 2^5 = 32
HEADER_BYTES = 16
ENTRY_BYTES = 10  # 2B sparse partial key + 8B pointer
LEAF_BYTES = 8


def key_bit(key: bytes, pos: int) -> int:
    """Bit ``pos`` of the 9-bit-per-byte expansion of ``key``."""
    byte_i, bit_j = divmod(pos, 9)
    if byte_i >= len(key):
        return 0
    if bit_j == 0:
        return 1  # byte-present marker: terminator (0) sorts first
    return (key[byte_i] >> (8 - bit_j)) & 1


def first_diff_bit(a: bytes, b: bytes) -> int:
    """First position where the 9-bit expansions of two distinct keys differ."""
    n = min(len(a), len(b))
    i = 0
    while i < n and a[i] == b[i]:
        i += 1
    if i == n:
        if len(a) == len(b):
            raise ValueError("keys are equal")
        return i * 9  # prefix pair: differ at the byte-present marker bit
    x, y = a[i], b[i]
    for bit_j in range(1, 9):
        if ((x >> (8 - bit_j)) & 1) != ((y >> (8 - bit_j)) & 1):
            return i * 9 + bit_j
    raise AssertionError("unreachable")


class _PLeaf:
    __slots__ = ("key", "value")

    def __init__(self, key: bytes, value: Any) -> None:
        self.key = key
        self.value = value


class _PNode:
    __slots__ = ("bitpos", "left", "right", "max_key")

    def __init__(self, bitpos: int, left: Any, right: Any) -> None:
        self.bitpos = bitpos
        self.left = left
        self.right = right
        self.max_key: bytes = b""


class HOT:
    """Simplified Height Optimized Trie over ``bytes`` keys."""

    def __init__(self) -> None:
        self.root: Optional[Any] = None
        self.n_keys = 0

    # -- build -----------------------------------------------------------
    def build(self, keys: Sequence[bytes], values: Optional[Sequence[Any]] = None) -> None:
        """Bulk-load *sorted unique* keys into a balanced Patricia trie."""
        if values is None:
            values = list(range(len(keys)))
        self.n_keys = len(keys)
        self.root = self._build(list(keys), list(values)) if keys else None

    def _build(self, keys: List[bytes], values: List[Any]) -> Any:
        if len(keys) == 1:
            return _PLeaf(keys[0], values[0])
        p = first_diff_bit(keys[0], keys[-1])
        # keys sorted and agreeing on all bits < p: 0-side is a prefix run
        lo, hi = 0, len(keys)
        while lo < hi:
            mid = (lo + hi) // 2
            if key_bit(keys[mid], p) == 0:
                lo = mid + 1
            else:
                hi = mid
        node = _PNode(p, self._build(keys[:lo], values[:lo]), self._build(keys[lo:], values[lo:]))
        node.max_key = keys[-1]
        return node

    # -- insert ----------------------------------------------------------
    def insert(self, key: bytes, value: Any) -> None:
        if self.root is None:
            self.root = _PLeaf(key, value)
            self.n_keys = 1
            return
        # Patricia two-pass insert: blind walk to any leaf, find the
        # discriminative bit, then insert at the right depth.
        node = self.root
        while isinstance(node, _PNode):
            node = node.right if key_bit(key, node.bitpos) else node.left
        if node.key == key:
            node.value = value
            return
        p = first_diff_bit(key, node.key)
        new_leaf = _PLeaf(key, value)
        bit = key_bit(key, p)
        parent = None
        cur = self.root
        went_right = False
        while isinstance(cur, _PNode) and cur.bitpos < p:
            cur.max_key = max(cur.max_key, key)
            parent = cur
            went_right = bool(key_bit(key, cur.bitpos))
            cur = cur.right if went_right else cur.left
        if bit:
            merged = _PNode(p, cur, new_leaf)
        else:
            merged = _PNode(p, new_leaf, cur)
        merged.max_key = max(key, self._subtree_max(cur))
        if parent is None:
            self.root = merged
        elif went_right:
            parent.right = merged
        else:
            parent.left = merged
        self.n_keys += 1

    @staticmethod
    def _subtree_max(node: Any) -> bytes:
        while isinstance(node, _PNode):
            node = node.right
        return node.key

    # -- queries ---------------------------------------------------------
    def lookup(self, key: bytes) -> Optional[Any]:
        node = self.root
        if node is None:
            return None
        while isinstance(node, _PNode):
            node = node.right if key_bit(key, node.bitpos) else node.left
        # branching points only -> verify against the record's full key
        return node.value if node.key == key else None

    def _iter_from(self, node: Any, start: bytes) -> Iterator[_PLeaf]:
        if isinstance(node, _PLeaf):
            if node.key >= start:
                yield node
            return
        if node.max_key < start:
            return
        yield from self._iter_from(node.left, start)
        yield from self._iter_from(node.right, start)

    def scan(self, start: bytes, count: int) -> List[Tuple[bytes, Any]]:
        out: List[Tuple[bytes, Any]] = []
        if self.root is None:
            return out
        for leaf in self._iter_from(self.root, start):
            out.append((leaf.key, leaf.value))
            if len(out) >= count:
                break
        return out

    # -- compound packing (memory + height model) ------------------------
    def _compound_stats(self) -> Tuple[int, int, float]:
        """(num_compound_nodes, total_entries, avg_leaf_compound_depth).

        Greedy top-down packing: each compound node absorbs up to
        ``_COMPOUND_LEVELS`` binary levels of the Patricia trie
        (fanout <= 32); its exits become child compounds or leaves.
        """
        if self.root is None or isinstance(self.root, _PLeaf):
            return (0, 0, 0.0) if self.root is None else (0, 1, 1.0)
        n_nodes = 0
        n_entries = 0
        depth_sum = 0
        n_leaves = 0
        stack: List[Tuple[Any, int]] = [(self.root, 1)]
        while stack:
            node, cdepth = stack.pop()
            n_nodes += 1
            # collect exits of up to _COMPOUND_LEVELS binary levels
            frontier: List[Any] = [node]
            for _ in range(_COMPOUND_LEVELS):
                nxt: List[Any] = []
                for f in frontier:
                    if isinstance(f, _PNode):
                        nxt.append(f.left)
                        nxt.append(f.right)
                    else:
                        nxt.append(f)
                if len(nxt) > MAX_COMPOUND_FANOUT:
                    break
                frontier = nxt
            for f in frontier:
                n_entries += 1
                if isinstance(f, _PNode):
                    stack.append((f, cdepth + 1))
                else:
                    depth_sum += cdepth
                    n_leaves += 1
        avg_depth = depth_sum / max(1, n_leaves)
        return n_nodes, n_entries, avg_depth

    def memory_bytes(self) -> int:
        n_nodes, n_entries, _ = self._compound_stats()
        return n_nodes * HEADER_BYTES + n_entries * ENTRY_BYTES + self.n_keys * LEAF_BYTES

    def avg_leaf_depth(self) -> float:
        return self._compound_stats()[2]

    def __len__(self) -> int:
        return self.n_keys
