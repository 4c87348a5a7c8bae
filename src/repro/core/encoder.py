"""Encoder module (HOPE §4.2): dictionary-lookup loop + bit concatenation.

``Encoder.encode`` repeatedly looks the remaining key suffix up in the
dictionary, consumes ``symbol_len`` bytes and appends the code bits,
until the suffix is empty. Codes are accumulated in a single arbitrary-
precision integer (Python's native big-int plays the role of the
paper's chain of 64-bit shift/OR buffers — same semantics, fewer moving
parts) and materialised as zero-padded bytes plus an explicit bit count.

Bitstring order of two encoded keys equals the lexicographic order of
``(padded_bytes, nbits)`` (proof in ``strutil``), so search trees can
consume the padded bytes directly — exactly what the HOPE C++ release
feeds its trees.

``encode_batch`` implements the §4.2 batching optimisation for sorted
key runs: the common prefix of the batch is encoded once, up to the
last dictionary step that stays inside the prefix, and each key resumes
from that checkpoint. ``encode_pair`` (batch of two) is what range
queries use for their boundary keys (Appendix B/D).
"""
from __future__ import annotations

from typing import List, Sequence, Tuple

from .dictionary import BaseDict
from .strutil import bits_to_bytes, lcp

EncodedKey = Tuple[bytes, int]  # (zero-padded payload, number of meaningful bits)


class Encoder:
    """Stateless encode driver over a built HOPE dictionary."""

    def __init__(self, dictionary: BaseDict):
        self.dictionary = dictionary

    # -- single-key ------------------------------------------------------
    def encode_bits(self, key: bytes) -> Tuple[int, int]:
        """Encode to (bit accumulator, total bits)."""
        lookup = self.dictionary.lookup
        acc = 0
        nbits = 0
        pos = 0
        n = len(key)
        while pos < n:
            code, cbits, symlen = lookup(key, pos)
            acc = (acc << cbits) | code
            nbits += cbits
            pos += symlen
        return acc, nbits

    def encode(self, key: bytes) -> EncodedKey:
        acc, nbits = self.encode_bits(key)
        return bits_to_bytes(acc, nbits), nbits

    # -- batched (sorted) ------------------------------------------------
    def _encode_prefix_checkpoint(self, prefix: bytes) -> Tuple[int, int, int]:
        """Encode as much of ``prefix`` as is *provably* shared work.

        A checkpoint step at ``pos`` is safe iff the interval found for
        ``prefix[pos:]`` provably contains every extension of the
        prefix. That holds whenever the remaining prefix is at least as
        long as the longest interval boundary (``max_boundary_len``):
        the next boundary above cannot then separate two extensions.
        This is why the paper's batching helps the fixed-interval and
        k-gram schemes but not ALM (unbounded boundaries → checkpoint
        consumes nothing), as observed in Appendix B.
        """
        lookup = self.dictionary.lookup
        maxlen = getattr(self.dictionary, "max_boundary_len", None)
        acc = 0
        nbits = 0
        pos = 0
        n = len(prefix)
        if maxlen is None:
            return acc, nbits, pos
        while n - pos >= maxlen:
            code, cbits, symlen = lookup(prefix, pos)
            acc = (acc << cbits) | code
            nbits += cbits
            pos += symlen
        return acc, nbits, pos

    def encode_batch(self, keys: Sequence[bytes]) -> List[EncodedKey]:
        """Encode a sorted run of keys, sharing the common-prefix work."""
        if not keys:
            return []
        if len(keys) == 1:
            return [self.encode(keys[0])]
        prefix = keys[0]
        for k in keys[1:]:
            prefix = lcp(prefix, k)
            if not prefix:
                break
        if not prefix:
            return [self.encode(k) for k in keys]
        acc0, nbits0, consumed = self._encode_prefix_checkpoint(prefix)
        lookup = self.dictionary.lookup
        out: List[EncodedKey] = []
        for k in keys:
            acc, nbits, pos = acc0, nbits0, consumed
            n = len(k)
            while pos < n:
                code, cbits, symlen = lookup(k, pos)
                acc = (acc << cbits) | code
                nbits += cbits
                pos += symlen
            out.append((bits_to_bytes(acc, nbits), nbits))
        return out

    def encode_pair(self, lo: bytes, hi: bytes) -> Tuple[EncodedKey, EncodedKey]:
        """Pair-encoding for the two boundary keys of a closed-range query."""
        a, b = self.encode_batch([lo, hi])
        return a, b
