"""Optimal order-preserving (alphabetic) prefix codes — HOPE's Code Assigner.

The paper uses the Hu-Tucker algorithm [27] (via the O(N^2) variant
[50]). We implement the **Garsia–Wachs** algorithm, which produces the
same optimal alphabetic code lengths (identical total cost) with a much
better practical running time, followed by the canonical alphabetic
code construction that the Hu-Tucker "recombination" phase performs.
Tests validate optimality against an O(n^3) dynamic program on small
inputs and validate the alphabetic/prefix-free properties on large
random inputs.

Terminology: given weights ``w_0..w_{n-1}`` in axis order, find code
lengths ``l_i`` minimising ``sum(w_i * l_i)`` such that a binary tree
exists whose in-order leaves have exactly those depths — equivalently,
such that monotonically increasing prefix codes of those lengths exist.
"""
from __future__ import annotations

from typing import List, Sequence, Tuple

from .strutil import Code


def garsia_wachs_depths(weights: Sequence[float]) -> List[int]:
    """Leaf depths of an optimal alphabetic binary tree over ``weights``.

    Classic three-phase Garsia–Wachs: (1) repeatedly combine the
    leftmost *locally minimal pair* and float the combined node left
    past smaller weights; (2) read leaf depths off the combined tree.
    List-based implementation: worst case O(n^2) movement, near
    O(n log n) on realistic frequency data.
    """
    n = len(weights)
    if n == 0:
        return []
    if n == 1:
        return [0]

    # Working sequence holds (weight, node). Leaves are ints (their
    # index); internal nodes are (left, right) tuples.
    seq: List[Tuple[float, object]] = [(float(w), i) for i, w in enumerate(weights)]

    while len(seq) > 1:
        m = len(seq)
        # Find leftmost j >= 1 with w[j-1] <= w[j+1] (w[m] = +inf).
        j = m - 1
        for k in range(1, m):
            right = seq[k + 1][0] if k + 1 < m else float("inf")
            if seq[k - 1][0] <= right:
                j = k
                break
        s = seq[j - 1][0] + seq[j][0]
        node = (seq[j - 1][1], seq[j][1])
        del seq[j - 1 : j + 1]
        # Float the combined node left: insert after the rightmost
        # element (strictly left of the removal point) with weight >= s.
        i = j - 1
        while i > 0 and seq[i - 1][0] < s:
            i -= 1
        seq.insert(i, (s, node))

    depths = [0] * n
    stack = [(seq[0][1], 0)]
    while stack:
        node, d = stack.pop()
        if isinstance(node, tuple):
            stack.append((node[0], d + 1))
            stack.append((node[1], d + 1))
        else:
            depths[node] = d
    return depths


def canonical_alphabetic_codes(depths: Sequence[int]) -> List[Code]:
    """Monotone prefix codes from a realisable alphabetic depth sequence.

    Standard level-by-level construction (the Hu-Tucker recombination
    phase): ``c_0 = 0`` at depth ``l_0``; each next code is
    ``(prev + 1)`` shifted to the next depth. Produces strictly
    increasing (bitstring order) prefix-free codes whenever ``depths``
    came from an alphabetic tree.
    """
    n = len(depths)
    if n == 0:
        return []
    if n == 1:
        # A one-entry dictionary still needs a non-empty code.
        return [(0, max(1, depths[0]))] if depths[0] == 0 else [(0, depths[0])]
    codes: List[Code] = []
    val = 0
    prev = depths[0]
    codes.append((0, prev))
    for l in depths[1:]:
        val += 1
        if l >= prev:
            val <<= l - prev
        else:
            val >>= prev - l
        codes.append((val, l))
        prev = l
    return codes


def hu_tucker_codes(weights: Sequence[float]) -> List[Code]:
    """Optimal order-preserving prefix codes for ``weights`` (axis order).

    Zero weights are clamped to a tiny positive value so every interval
    receives a code (completeness requires codes even for intervals the
    sample never hit).
    """
    if not weights:
        return []
    floor = max(max(weights), 1.0) * 1e-9
    w = [max(float(x), floor) for x in weights]
    return canonical_alphabetic_codes(garsia_wachs_depths(w))


def optimal_alphabetic_cost(weights: Sequence[float]) -> float:
    """O(n^3) DP for the optimal alphabetic tree cost — test oracle only.

    Knuth-style interval DP: cost(i,j) = min_k cost(i,k)+cost(k+1,j) +
    sum(w[i..j]). Returns sum(w_i * depth_i) of the optimal tree.
    """
    n = len(weights)
    if n <= 1:
        return 0.0
    w = [float(x) for x in weights]
    pref = [0.0]
    for x in w:
        pref.append(pref[-1] + x)
    INF = float("inf")
    cost = [[0.0] * n for _ in range(n)]
    for span in range(1, n):
        for i in range(n - span):
            j = i + span
            best = INF
            for k in range(i, j):
                c = cost[i][k] + cost[k + 1][j]
                if c < best:
                    best = c
            cost[i][j] = best + (pref[j + 1] - pref[i])
    return cost[0][n - 1]
