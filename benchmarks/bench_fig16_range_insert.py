"""Figure 16 (Appendix D) — range scans and inserts on the four indexes."""
import pytest

from repro.bench.harness import make_tree
from repro.core.hope import build_hope
from repro.workloads.ycsb import workload_e

TREES = ("art", "hot", "btree", "prefixbtree")
CONFIGS = {"uncompressed": None, "double": "double"}


@pytest.fixture(scope="module")
def cells(email_bench_keys, email_sample):
    out = {}
    load, pool = email_bench_keys[:-500], email_bench_keys[-500:]
    for cname, scheme in CONFIGS.items():
        hope = build_hope(scheme, email_sample, max_dict_entries=4096) if scheme else None
        if hope:
            tkeys = sorted(hope.encode(k)[0] for k in load)
            tpool = [hope.encode(k)[0] for k in pool]
        else:
            tkeys, tpool = sorted(load), list(pool)
        for tname in TREES:
            tree = make_tree(tname)
            tree.build(tkeys, list(range(len(tkeys))))
            out[(tname, cname)] = (tree, hope, load, tpool)
    return out


@pytest.mark.parametrize("tree_name", TREES)
@pytest.mark.parametrize("config", list(CONFIGS))
def test_fig16_scan(benchmark, cells, tree_name, config):
    tree, hope, load, _ = cells[(tree_name, config)]
    ops = [o for o in workload_e(load, [], 200, seed=4) if o[0] == "scan"]
    enc = hope.encoder.encode if hope else None

    def run():
        for _, k, slen in ops:
            tree.scan(enc(k)[0] if enc else k, slen)

    benchmark(run)


@pytest.mark.parametrize("tree_name", TREES)
@pytest.mark.parametrize("config", list(CONFIGS))
def test_fig16_insert(benchmark, cells, tree_name, config):
    tree, hope, _, tpool = cells[(tree_name, config)]

    def run():
        for k in tpool[:200]:
            tree.insert(k, -1)

    benchmark(run)
