"""Figure 5 — MCOS generation time vs duration parameter d (w=300)."""
import pytest

from repro.bench import DATASET_ORDER, object_stream, run_mcos, scaled_w_d

DURATIONS = (180, 210, 240, 270)
METHODS = ("naive", "mfs", "ssg")


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("d0", DURATIONS)
@pytest.mark.parametrize("name", DATASET_ORDER)
def test_fig5(benchmark, name, d0, method):
    w, d = scaled_w_d(300, d0)
    stream = object_stream(name)
    res = benchmark.pedantic(lambda: run_mcos(stream, method, w, d), rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"results": res["results"], "peak_states": res["peak_states"]}
    )
