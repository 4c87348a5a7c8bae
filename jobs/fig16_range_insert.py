"""Figure 16 (Appendix D) — YCSB-E range scans and inserts on ART, HOT,
B+tree, Prefix B+tree (email + wiki; range bounds pair-encoded).

Usage: spark-submit jobs/fig16_range_insert.py [n_keys]
"""
import sys

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import get_spark, print_table

from repro.bench.harness import CONFIGS, run_tree_bench
from repro.workloads.datasets import dataset_keys

TREES = ("art", "hot", "btree", "prefixbtree")


def main(n_keys: int = 20_000) -> None:
    spark = get_spark("fig16")
    cells = [
        (ds, tree, config)
        for ds in ("email", "wiki")
        for tree in TREES
        for config in CONFIGS
    ]

    def run_cell(cell):
        ds, tree, config = cell
        keys = dataset_keys(ds, n_keys, seed=16)
        r = run_tree_bench(tree, config, keys, n_queries=1200, seed=3)
        return (
            ds,
            tree,
            config,
            round(r["range_ns"]),
            round(r["insert_ns"]) if r["insert_ns"] else None,
            int(r["memory_bytes"]),
        )

    rows = spark.sparkContext.parallelize(cells, len(cells)).map(run_cell).collect()
    print_table(
        "Figure 16 — YCSB-E range scans + inserts",
        ["dataset", "tree", "config", "range ns (py)", "insert ns (py)", "memory B"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 20_000)
