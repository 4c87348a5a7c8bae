"""Figure 9 — dictionary build time per scheme (email 1% sample).

One build round per scheme; the symbol-select / code-assign /
dict-build breakdown is attached as extra_info (the figure's stacking).
"""
import pytest

from repro.core.hope import SCHEMES, build_hope

DICT = 4096


@pytest.mark.parametrize("scheme", SCHEMES)
def test_fig9_build_time(benchmark, email_sample, scheme):
    hope_holder = {}

    def build():
        hope_holder["h"] = build_hope(scheme, email_sample, max_dict_entries=DICT)

    benchmark.pedantic(build, rounds=2, iterations=1, warmup_rounds=0)
    bt = hope_holder["h"].build_times
    for k, v in bt.items():
        benchmark.extra_info[k + "_s"] = round(v, 4)
