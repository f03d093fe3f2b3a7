"""Figure 7 — MCOS generation time vs occlusion (id reuse) p_o."""
import pytest

from repro.bench import DATASET_ORDER, object_stream, run_mcos, scaled_w_d

P_OS = (0, 1, 2, 3)
METHODS = ("naive", "mfs", "ssg")


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("p_o", P_OS)
@pytest.mark.parametrize("name", DATASET_ORDER)
def test_fig7(benchmark, name, p_o, method):
    w, d = scaled_w_d()
    stream = object_stream(name, p_o)
    res = benchmark.pedantic(lambda: run_mcos(stream, method, w, d), rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"results": res["results"], "peak_states": res["peak_states"]}
    )
