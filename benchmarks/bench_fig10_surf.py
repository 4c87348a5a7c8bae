"""Figure 10 — SuRF YCSB point/range queries under HOPE configs."""
import pytest

from repro.core.hope import build_hope
from repro.trees.surf import SuRF
from repro.workloads.ycsb import surf_range_queries, workload_c

CONFIGS = {
    "uncompressed": None,
    "double": ("double", None),
    "3grams": ("3grams", 4096),
    "alm-improved": ("alm-improved", 4096),
}


@pytest.fixture(scope="module")
def cells(email_bench_keys, email_sample):
    out = {}
    for name, cfg in CONFIGS.items():
        if cfg is None:
            hope = None
            tkeys = sorted(email_bench_keys)
        else:
            hope = build_hope(cfg[0], email_sample, max_dict_entries=cfg[1] or (1 << 16))
            tkeys = sorted(hope.encode(k)[0] for k in email_bench_keys)
        tree = SuRF(suffix_bits=8)
        tree.build(tkeys)
        out[name] = (tree, hope)
    return out


@pytest.mark.parametrize("config", list(CONFIGS))
def test_fig10_surf_point(benchmark, cells, email_bench_keys, config):
    tree, hope = cells[config]
    queries = workload_c(email_bench_keys, 400, seed=1)
    enc = hope.encoder.encode if hope else None

    def run():
        for q in queries:
            tree.may_contain(enc(q)[0] if enc else q)

    benchmark(run)
    benchmark.extra_info["memory_bytes"] = tree.memory_bytes()
    benchmark.extra_info["trie_height"] = round(tree.avg_leaf_depth(), 2)


@pytest.mark.parametrize("config", list(CONFIGS))
def test_fig10_surf_range(benchmark, cells, email_bench_keys, config):
    tree, hope = cells[config]
    ranges = surf_range_queries(email_bench_keys, 400, seed=2)
    pair = hope.encoder.encode_pair if hope else None

    def run():
        for lo, hi in ranges:
            if pair:
                (lo_b, _), (hi_b, _) = pair(lo, hi)
            else:
                lo_b, hi_b = lo, hi
            tree.may_contain_range(lo_b, hi_b)

    benchmark(run)
