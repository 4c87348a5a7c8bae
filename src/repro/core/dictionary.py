"""Dictionary module (HOPE §4.2): interval -> code lookup structures.

A HOPE dictionary stores only the *left boundary* of each interval; a
lookup is a "greatest boundary <= suffix" (predecessor) query returning
the interval's code and symbol length. Four structures, as in the
paper (Table 1), all behaviourally identical and cross-checked by
tests:

* ``ArrayDict``      — Single-Char (256 entries) and Double-Char
                       (256*257 entries, terminator layout): one O(1)
                       array probe;
* ``TrieDict(model="bitmap")`` — the 3-Grams/4-Grams bitmap-trie
                       (Figure 6): breadth-first nodes of
                       256-bit-bitmap + 32-bit counter (36 B/node);
* ``TrieDict(model="art")``    — the ART-based dictionary for ALM /
                       ALM-Improved: same lookup, ART-style adaptive
                       node memory accounting with full (non-optimistic)
                       path compression, per the paper's three ART
                       modifications;
* ``SortedBoundaryDict`` — binary search over the boundary list; the
                       baseline the paper reports the bitmap-trie to be
                       2.3x faster than.

Memory accounting is analytic (see ``memory_bytes``): Python object
overhead is irrelevant to the paper's numbers, which are layout
arithmetic (DESIGN.md §3/§5).
"""
from __future__ import annotations

from bisect import bisect_left, bisect_right
from typing import Dict, List, Optional, Sequence, Tuple

from .intervals import Interval

Lookup = Tuple[int, int, int]  # (code, nbits, symbol_len)

# Per-entry value cost shared by all structures: 32-bit code + 8-bit length.
_VALUE_BYTES = 5


class BaseDict:
    """Interface: lookup(src, pos) -> (code, nbits, symbol_len)."""

    def lookup(self, src: bytes, pos: int) -> Lookup:  # pragma: no cover
        raise NotImplementedError

    def memory_bytes(self) -> int:  # pragma: no cover
        raise NotImplementedError

    def __len__(self) -> int:  # pragma: no cover
        raise NotImplementedError


class SortedBoundaryDict(BaseDict):
    """Binary search over sorted left boundaries — correctness baseline."""

    def __init__(self, intervals: Sequence[Interval]):
        self.boundaries: List[bytes] = [iv.lo for iv in intervals]
        self.values: List[Lookup] = [(iv.code, iv.nbits, len(iv.symbol)) for iv in intervals]
        self.max_boundary_len: int = max(len(b) for b in self.boundaries)

    def lookup(self, src: bytes, pos: int) -> Lookup:
        suffix = src[pos:]
        i = bisect_right(self.boundaries, suffix) - 1
        if i < 0:
            raise KeyError(f"no interval contains {suffix!r} (incomplete dictionary)")
        return self.values[i]

    def memory_bytes(self) -> int:
        # boundary bytes + 8B offset per entry + value payload
        return sum(len(b) for b in self.boundaries) + len(self.boundaries) * (8 + _VALUE_BYTES)

    def __len__(self) -> int:
        return len(self.boundaries)


class ArrayDict(BaseDict):
    """Fixed-length-interval array dictionary (Single-Char / Double-Char).

    ``width=1``: 256 entries, entry ``b`` covers ``[b, b+1)``.
    ``width=2``: 256*257 entries in the paper's terminator layout —
    entry ``b1*257`` is the 1-byte symbol ``b1`` (interval
    ``[b1, b1\\x00)``, i.e. the exact string ``b1``), entries
    ``b1*257 + 1 + b2`` are the 2-byte symbols.
    """

    def __init__(self, intervals: Sequence[Interval], width: int):
        if width not in (1, 2):
            raise ValueError("ArrayDict supports widths 1 and 2")
        expected = 256 if width == 1 else 256 * 257
        if len(intervals) != expected:
            raise ValueError(f"width-{width} ArrayDict needs {expected} entries, got {len(intervals)}")
        self.width = width
        self.max_boundary_len: int = width
        self.codes: List[int] = [iv.code for iv in intervals]
        self.nbits: List[int] = [iv.nbits for iv in intervals]
        self.symlen: List[int] = [len(iv.symbol) for iv in intervals]

    def lookup(self, src: bytes, pos: int) -> Lookup:
        if self.width == 1:
            i = src[pos]
        else:
            b1 = src[pos]
            i = b1 * 257 + 1 + src[pos + 1] if pos + 1 < len(src) else b1 * 257
        return (self.codes[i], self.nbits[i], self.symlen[i])

    def memory_bytes(self) -> int:
        return len(self.codes) * _VALUE_BYTES

    def __len__(self) -> int:
        return len(self.codes)


class _TrieNode:
    __slots__ = ("children", "labels", "term", "max_val")

    def __init__(self) -> None:
        self.children: Dict[int, "_TrieNode"] = {}
        self.labels: List[int] = []  # sorted
        self.term: Optional[int] = None  # value index if a boundary ends here
        self.max_val: int = -1  # max value index in subtree


class TrieDict(BaseDict):
    """Trie over interval left boundaries with predecessor lookup.

    ``model="bitmap"`` reproduces the paper's bitmap-trie accounting
    (36 B per node: 256-bit bitmap + 32-bit prefix-counter; Figure 6),
    appropriate for the bounded-depth 3-Grams/4-Grams boundaries.

    ``model="art"`` reproduces the modified-ART accounting for ALM
    boundaries of arbitrary length: single-child chains collapse into
    a stored full prefix (no optimistic skipping, per §4.2), and each
    branching node is charged the smallest fitting adaptive node type
    (Node4/16/48/256 + 16 B header).
    """

    def __init__(self, intervals: Sequence[Interval], model: str = "bitmap"):
        if model not in ("bitmap", "art"):
            raise ValueError("model must be 'bitmap' or 'art'")
        self.model = model
        self.values: List[Lookup] = [(iv.code, iv.nbits, len(iv.symbol)) for iv in intervals]
        self.max_boundary_len: int = max(len(iv.lo) for iv in intervals)
        self.root = _TrieNode()
        self.n_entries = len(intervals)
        for idx, iv in enumerate(intervals):
            node = self.root
            node.max_val = max(node.max_val, idx)
            for b in iv.lo:
                child = node.children.get(b)
                if child is None:
                    child = _TrieNode()
                    node.children[b] = child
                    node.labels.append(b)  # boundaries sorted -> labels arrive sorted
                node = child
                node.max_val = max(node.max_val, idx)
            if node.term is not None:
                raise ValueError(f"duplicate boundary {iv.lo!r}")
            node.term = idx

    def _subtree_max(self, node: _TrieNode) -> int:
        return node.max_val

    def lookup(self, src: bytes, pos: int) -> Lookup:
        node = self.root
        d = pos
        n = len(src)
        cand = -1  # best value index strictly below the current path tip
        while True:
            if d >= n:
                if node.term is not None:
                    return self.values[node.term]
                break
            if node.term is not None:
                cand = node.term
            c = src[d]
            labels = node.labels
            # greatest label < c as a deeper (hence greater) candidate
            j = bisect_left(labels, c)
            if j > 0:
                cand = node.children[labels[j - 1]].max_val
            child = node.children.get(c)
            if child is None:
                break
            node = child
            d += 1
        if cand < 0:
            raise KeyError(f"no interval contains {src[pos:]!r} (incomplete dictionary)")
        return self.values[cand]

    # -- memory models ---------------------------------------------------
    def _count_bitmap_nodes(self) -> int:
        count = 0
        stack = [self.root]
        while stack:
            nd = stack.pop()
            count += 1
            stack.extend(nd.children.values())
        return count

    @staticmethod
    def _art_node_bytes(fanout: int) -> int:
        header = 16
        if fanout <= 4:
            return header + 4 * 1 + 4 * 8
        if fanout <= 16:
            return header + 16 * 1 + 16 * 8
        if fanout <= 48:
            return header + 256 + 48 * 8
        return header + 256 * 8

    def _art_memory(self) -> int:
        # Collapse single-child, non-terminal chains into prefixes; charge
        # each remaining node an adaptive layout + its stored full prefix.
        total = 0
        stack = [self.root]
        while stack:
            nd = stack.pop()
            fanout = len(nd.children) + (1 if nd.term is not None else 0)
            total += self._art_node_bytes(max(1, fanout))
            for child in nd.children.values():
                # collapse this child's unary chain into a stored prefix
                chain = 0
                cur = child
                while len(cur.children) == 1 and cur.term is None:
                    chain += 1
                    cur = next(iter(cur.children.values()))
                total += chain  # full common prefix stored (no OCPS)
                stack.append(cur)
        return total

    def memory_bytes(self) -> int:
        if self.model == "bitmap":
            return self._count_bitmap_nodes() * 36 + self.n_entries * _VALUE_BYTES
        return self._art_memory() + self.n_entries * _VALUE_BYTES

    def __len__(self) -> int:
        return self.n_entries
