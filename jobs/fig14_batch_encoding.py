"""Figure 14 (Appendix B) — batch encoding latency vs batch size on a
pre-sorted email sample (dict 2^16 for the gram schemes).

Usage: spark-submit jobs/fig14_batch_encoding.py [n_keys]
"""
import sys
import time

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import print_table

from repro.core.hope import build_hope
from repro.workloads.datasets import email_keys

SCHEMES = ["single", "double", "3grams", "4grams", "alm", "alm-improved"]
BATCHES = [1, 2, 32]


def main(n_keys: int = 25_000) -> None:
    keys = sorted(email_keys(n_keys, seed=14))
    sample = keys[: max(100, n_keys // 100)]
    nchars = sum(map(len, keys))
    rows = []
    for scheme in SCHEMES:
        hope = build_hope(scheme, sample, max_dict_entries=1 << 16)
        lat = []
        for batch in BATCHES:
            t0 = time.perf_counter()
            if batch == 1:
                enc = hope.encoder.encode
                for k in keys:
                    enc(k)
            else:
                eb = hope.encoder.encode_batch
                for i in range(0, len(keys), batch):
                    eb(keys[i : i + batch])
            lat.append(round((time.perf_counter() - t0) / nchars * 1e9, 1))
        rows.append([scheme] + lat)
        print(f"# done {scheme}", file=sys.stderr)
    print_table(
        "Figure 14 — batch encoding latency (ns/char), sorted email keys",
        ["scheme"] + [f"batch={b}" for b in BATCHES],
        rows,
    )


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 25_000)
