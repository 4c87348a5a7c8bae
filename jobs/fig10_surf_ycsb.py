"""Figure 10 — SuRF YCSB evaluation (point + range, memory, height).

Seven configurations x three datasets. Also prints the paper's §5
modeled latency reduction (computed from measured CPR / key length /
trie height with the paper's C++ timing constants) next to the raw
Python wall-clock, since Python per-char encode costs dominate
wall-clock in ways the C++ implementation does not (see
EXPERIMENTS.md).

Usage: spark-submit jobs/fig10_surf_ycsb.py [n_keys]
"""
import sys

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import modeled_latency_reduction, print_table

from repro.bench.harness import CONFIGS, run_tree_bench
from repro.workloads.datasets import dataset_keys


def main(n_keys: int = 30_000) -> None:
    rows = []
    for ds in ("email", "wiki", "url"):
        n = n_keys if ds != "url" else n_keys // 3
        keys = dataset_keys(ds, n, seed=10)
        l = sum(map(len, keys)) / len(keys)
        base_h = None
        for config in CONFIGS:
            r = run_tree_bench("surf", config, keys, n_queries=2000, seed=1)
            if config == "uncompressed":
                base_h = r["height"]
            model = modeled_latency_reduction(config, r["cpr"], l, base_h or 1)
            rows.append(
                (
                    ds,
                    config,
                    round(r["point_ns"]),
                    round(r["range_ns"]),
                    r["tree_memory_bytes"],
                    r["memory_bytes"],
                    round(r["height"], 1),
                    round(r["cpr"], 2),
                    None if model is None else f"{model * 100:.0f}%",
                )
            )
            print(f"# done {ds}/{config}", file=sys.stderr)
    print_table(
        "Figure 10 — SuRF YCSB (Zipf)",
        ["dataset", "config", "point ns (py)", "range ns (py)", "tree B", "tree+dict B", "trie height", "CPR", "modeled Δlatency (paper consts)"],
        rows,
    )


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 30_000)
