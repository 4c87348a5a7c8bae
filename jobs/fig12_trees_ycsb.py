"""Figure 12 — YCSB point queries on ART, HOT, B+tree, Prefix B+tree.

Seven configurations x three datasets x four indexes: point latency
(Python wall-clock), memory (tree + dictionary), trie height where
applicable, CPR. Runs partition-parallel in Spark: each (tree, config,
dataset) cell is a task building its own in-memory tree.

Usage: spark-submit jobs/fig12_trees_ycsb.py [n_keys]
"""
import sys

import os

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))
from _common import get_spark, print_table

from repro.bench.harness import CONFIGS, run_tree_bench
from repro.workloads.datasets import dataset_keys

TREES = ("art", "hot", "btree", "prefixbtree")


def main(n_keys: int = 30_000) -> None:
    spark = get_spark("fig12")
    cells = []
    for ds in ("email", "wiki", "url"):
        for tree in TREES:
            for config in CONFIGS:
                cells.append((ds, tree, config))

    nk = {"email": n_keys, "wiki": n_keys, "url": n_keys // 3}

    def run_cell(cell):
        ds, tree, config = cell
        keys = dataset_keys(ds, nk[ds], seed=12)
        r = run_tree_bench(tree, config, keys, n_queries=1500, seed=2)
        return (
            ds,
            tree,
            config,
            round(r["point_ns"]),
            int(r["tree_memory_bytes"]),
            int(r["memory_bytes"]),
            round(r["height"], 1) if r["height"] is not None else None,
            round(r["cpr"], 2),
        )

    rows = (
        spark.sparkContext.parallelize(cells, len(cells))
        .map(run_cell)
        .collect()
    )
    print_table(
        "Figure 12 — YCSB point queries (Zipf)",
        ["dataset", "tree", "config", "point ns (py)", "tree B", "tree+dict B", "height", "CPR"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main(int(sys.argv[1]) if len(sys.argv) > 1 else 30_000)
