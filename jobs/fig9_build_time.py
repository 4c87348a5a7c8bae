"""Figure 9 — dictionary build time breakdown (email, 1% sample).

Per scheme (variable-interval schemes at 2^12 and 2^16): time spent in
the Symbol Selector, Code Assigner, and Dictionary modules.

Usage: spark-submit jobs/fig9_build_time.py [n_samples]
"""
import sys

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import print_table

from repro.core.hope import build_hope
from repro.workloads.datasets import email_keys

CONFIGS = [
    ("single", 256),
    ("double", 256 * 257),
    ("alm", 1 << 12),
    ("alm", 1 << 16),
    ("3grams", 1 << 12),
    ("3grams", 1 << 16),
    ("4grams", 1 << 12),
    ("4grams", 1 << 16),
    ("alm-improved", 1 << 12),
    ("alm-improved", 1 << 16),
]


def main(n_samples: int = 2500) -> None:
    sample = email_keys(n_samples, seed=9)
    rows = []
    for scheme, size in CONFIGS:
        hope = build_hope(scheme, sample, max_dict_entries=size)
        bt = hope.build_times
        rows.append(
            (
                scheme,
                size,
                hope.dict_entries,
                round(bt["symbol_select"], 3),
                round(bt["code_assign"], 3),
                round(bt["dict_build"], 3),
                round(sum(bt.values()), 3),
            )
        )
        print(f"# built {scheme}/{size}", file=sys.stderr)
    print_table(
        "Figure 9 — dictionary build time (s), email 1% sample",
        ["scheme", "dict limit", "entries", "symbol select", "code assign", "dict build", "total"],
        rows,
    )


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 2500)
