"""Figure 12 — point queries on ART / HOT / B+tree / Prefix B+tree."""
import pytest

from repro.bench.harness import make_tree
from repro.core.hope import build_hope
from repro.workloads.ycsb import workload_c

TREES = ("art", "hot", "btree", "prefixbtree")
CONFIGS = {"uncompressed": None, "double": "double", "3grams": "3grams"}


@pytest.fixture(scope="module")
def cells(email_bench_keys, email_sample):
    out = {}
    for cname, scheme in CONFIGS.items():
        hope = build_hope(scheme, email_sample, max_dict_entries=4096) if scheme else None
        tkeys = sorted(hope.encode(k)[0] for k in email_bench_keys) if hope else sorted(email_bench_keys)
        for tname in TREES:
            tree = make_tree(tname)
            tree.build(tkeys, list(range(len(tkeys))))
            out[(tname, cname)] = (tree, hope)
    return out


@pytest.mark.parametrize("tree_name", TREES)
@pytest.mark.parametrize("config", list(CONFIGS))
def test_fig12_point(benchmark, cells, email_bench_keys, tree_name, config):
    tree, hope = cells[(tree_name, config)]
    queries = workload_c(email_bench_keys, 300, seed=3)
    enc = hope.encoder.encode if hope else None

    def run():
        for q in queries:
            tree.lookup(enc(q)[0] if enc else q)

    benchmark(run)
    benchmark.extra_info["memory_bytes"] = tree.memory_bytes() + (
        hope.dict_memory_bytes() if hope else 0
    )
    if hasattr(tree, "avg_leaf_depth"):
        benchmark.extra_info["height"] = round(tree.avg_leaf_depth(), 2)
