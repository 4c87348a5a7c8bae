"""Figure 15 (Appendix C) — compression rate under a dramatic key
distribution change: Email-A (gmail+yahoo) vs Email-B (rest), encoding
each dataset with each dictionary.

Usage: spark-submit jobs/fig15_distribution_change.py [n_keys]
"""
import sys

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import print_table

from repro.core.hope import SCHEMES, build_hope
from repro.workloads.datasets import email_split_ab


def main(n_keys: int = 40_000) -> None:
    a, b = email_split_ab(n_keys, seed=15)
    sample_a, sample_b = a[: max(100, len(a) // 20)], b[: max(100, len(b) // 20)]
    rows = []
    for scheme in SCHEMES:
        da = build_hope(scheme, sample_a, max_dict_entries=1 << 12)
        db = build_hope(scheme, sample_b, max_dict_entries=1 << 12)
        rows.append(
            (
                scheme,
                round(da.compression_rate(a[:8000]), 3),  # stable: Dict-A on A
                round(db.compression_rate(b[:8000]), 3),  # stable: Dict-B on B
                round(da.compression_rate(b[:8000]), 3),  # shift:  Dict-A on B
                round(db.compression_rate(a[:8000]), 3),  # shift:  Dict-B on A
            )
        )
        print(f"# done {scheme}", file=sys.stderr)
    print_table(
        "Figure 15 — CPR under key-distribution change (dict 4K)",
        ["scheme", "Dict-A,Email-A", "Dict-B,Email-B", "Dict-A,Email-B", "Dict-B,Email-A"],
        rows,
    )


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 40_000)
