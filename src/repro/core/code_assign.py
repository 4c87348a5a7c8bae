"""Code Assigner module (HOPE §4.2).

Two strategies, as in the paper:

* ``assign_fixed`` — monotonically increasing fixed-length codes of
  ``ceil(log2 N)`` bits (used by ALM);
* ``assign_hu_tucker`` — optimal order-preserving prefix codes from the
  interval access probabilities (used by Single/Double-Char, 3/4-Grams,
  ALM-Improved).

Probabilities are the per-lookup interval hit rates obtained by
test-encoding the sample (Symbol Selector's last step). Hu-Tucker on
the raw hit rates minimises ``sum(p_i * len(c_i))``, i.e. maximises the
paper's CPR for a fixed interval division.
"""
from __future__ import annotations

import math
from typing import List, Sequence

from .hu_tucker import hu_tucker_codes
from .strutil import Code


def assign_fixed(n: int) -> List[Code]:
    """Monotone fixed-length codes 0..n-1, each ceil(log2 n) bits."""
    if n <= 0:
        return []
    nbits = max(1, math.ceil(math.log2(n))) if n > 1 else 1
    return [(i, nbits) for i in range(n)]


def assign_hu_tucker(probabilities: Sequence[float]) -> List[Code]:
    """Optimal order-preserving prefix codes for the given axis-ordered weights."""
    return hu_tucker_codes(probabilities)
