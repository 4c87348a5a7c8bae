"""HOPE facade: Build phase wiring (paper Table 1 + Figure 5).

``build_hope(scheme, samples, max_dict_entries)`` runs the two-module
build pipeline — Symbol Selector → Code Assigner — and materialises the
scheme's Dictionary + Encoder:

=============  ================  =============  ==============
Scheme         Symbol Selector   Code Assigner  Dictionary
=============  ================  =============  ==============
single         Single-Char       Hu-Tucker      Array (256)
double         Double-Char       Hu-Tucker      Array (256*257)
alm            ALM               Fixed-Length   ART-based trie
3grams         3-Grams           Hu-Tucker      Bitmap-trie
4grams         4-Grams           Hu-Tucker      Bitmap-trie
alm-improved   ALM-Improved      Hu-Tucker      ART-based trie
=============  ================  =============  ==============

Build timing is recorded per module (symbol_select / code_assign /
dict_build) to reproduce Figure 9. Interval access probabilities come
from a test encoding of the samples over the chosen intervals (§4.2),
using the binary-search baseline dictionary.
"""
from __future__ import annotations

import time
from bisect import bisect_right
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence

from . import symbol_select as ss
from .code_assign import assign_fixed, assign_hu_tucker
from .dictionary import ArrayDict, BaseDict, SortedBoundaryDict, TrieDict
from .encoder import EncodedKey, Encoder
from .intervals import Interval, build_intervals, check_order_preserving, with_codes

SCHEMES = ("single", "double", "3grams", "4grams", "alm", "alm-improved")

#: scheme -> (selector kind, fixed dictionary size or None, code kind, dict kind)
SCHEME_TABLE = {
    "single": ("single", 256, "hu-tucker", "array"),
    "double": ("double", 256 * 257, "hu-tucker", "array"),
    "alm": ("alm", None, "fixed", "art"),
    "3grams": ("grams3", None, "hu-tucker", "bitmap"),
    "4grams": ("grams4", None, "hu-tucker", "bitmap"),
    "alm-improved": ("alm-improved", None, "hu-tucker", "art"),
}


@dataclass
class HopeEncoder:
    """A built HOPE instance: dictionary + encoder + build metadata."""

    scheme: str
    dictionary: BaseDict
    encoder: Encoder
    intervals: List[Interval]
    build_times: Dict[str, float] = field(default_factory=dict)

    @property
    def dict_entries(self) -> int:
        return len(self.intervals)

    def dict_memory_bytes(self) -> int:
        return self.dictionary.memory_bytes()

    def encode(self, key: bytes) -> EncodedKey:
        return self.encoder.encode(key)

    def encode_many(self, keys: Sequence[bytes]) -> List[EncodedKey]:
        enc = self.encoder.encode
        return [enc(k) for k in keys]

    def compression_rate(self, keys: Sequence[bytes], byte_aligned: bool = False) -> float:
        """uncompressed bytes / compressed bytes over ``keys``.

        ``byte_aligned=True`` charges each key ceil(nbits/8) — what a
        byte-oriented tree stores; the default is bit-exact, matching
        the microbenchmark CPR definition (§6.1).
        """
        orig = 0
        comp_bits = 0
        comp_bytes = 0
        for k in keys:
            orig += len(k)
            _, nbits = self.encoder.encode_bits(k)
            comp_bits += nbits
            comp_bytes += (nbits + 7) // 8
        if orig == 0:
            return 1.0
        denom = comp_bytes if byte_aligned else comp_bits / 8.0
        return orig / denom if denom else float("inf")


def _select_boundaries(kind: str, samples: Sequence[bytes], max_entries: int, freqs) -> List[bytes]:
    if kind == "single":
        return ss.select_single_char(samples)
    if kind == "double":
        return ss.select_double_char(samples)
    if kind == "grams3":
        return ss.select_grams(samples, 3, max_entries, freqs=freqs)
    if kind == "grams4":
        return ss.select_grams(samples, 4, max_entries, freqs=freqs)
    if kind == "alm":
        return ss.select_alm(samples, max_entries, improved=False, freqs=freqs)
    if kind == "alm-improved":
        return ss.select_alm(samples, max_entries, improved=True, freqs=freqs)
    raise ValueError(f"unknown selector {kind}")


def _test_encode_probabilities(
    intervals: Sequence[Interval], samples: Sequence[bytes]
) -> List[float]:
    """Interval hit counts from test-encoding the samples (§4.2)."""
    boundaries = [iv.lo for iv in intervals]
    symlens = [len(iv.symbol) for iv in intervals]
    hits = [0] * len(intervals)
    for key in samples:
        pos = 0
        n = len(key)
        while pos < n:
            i = bisect_right(boundaries, key[pos:]) - 1
            hits[i] += 1
            pos += symlens[i]
    return [float(h) for h in hits]


def _build_dictionary(kind: str, intervals: Sequence[Interval]) -> BaseDict:
    if kind == "array":
        width = 1 if len(intervals) == 256 else 2
        return ArrayDict(intervals, width=width)
    if kind == "bitmap":
        return TrieDict(intervals, model="bitmap")
    if kind == "art":
        return TrieDict(intervals, model="art")
    if kind == "sorted":
        return SortedBoundaryDict(intervals)
    raise ValueError(f"unknown dictionary kind {kind}")


def build_hope(
    scheme: str,
    samples: Sequence[bytes],
    max_dict_entries: int = 1 << 16,
    freqs=None,
    validate: bool = False,
    dictionary_kind: Optional[str] = None,
) -> HopeEncoder:
    """Run HOPE's Build phase and return a ready-to-encode instance.

    ``freqs`` optionally supplies pre-computed pattern frequencies (the
    Spark path); ``validate`` runs the string-axis model checks;
    ``dictionary_kind`` overrides the scheme's dictionary structure
    (used by the bitmap-trie-vs-binary-search microbenchmark).
    """
    if scheme not in SCHEME_TABLE:
        raise ValueError(f"unknown scheme {scheme!r}; expected one of {SCHEMES}")
    sel_kind, fixed_size, code_kind, dict_kind = SCHEME_TABLE[scheme]
    if dictionary_kind is not None:
        dict_kind = dictionary_kind
    if fixed_size is not None:
        max_dict_entries = fixed_size

    t0 = time.perf_counter()
    boundaries = _select_boundaries(sel_kind, samples, max_dict_entries, freqs)
    intervals = build_intervals(boundaries)
    probs = _test_encode_probabilities(intervals, samples)
    t1 = time.perf_counter()

    if code_kind == "fixed":
        codes = assign_fixed(len(intervals))
    else:
        codes = assign_hu_tucker(probs)
    t2 = time.perf_counter()

    intervals = with_codes(intervals, codes)
    dictionary = _build_dictionary(dict_kind, intervals)
    t3 = time.perf_counter()

    if validate:
        check_order_preserving(intervals)

    return HopeEncoder(
        scheme=scheme,
        dictionary=dictionary,
        encoder=Encoder(dictionary),
        intervals=intervals,
        build_times={
            "symbol_select": t1 - t0,
            "code_assign": t2 - t1,
            "dict_build": t3 - t2,
        },
    )
