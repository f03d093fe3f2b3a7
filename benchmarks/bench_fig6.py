"""Figure 6 — MCOS generation time vs window size w (d=240)."""
import pytest

from repro.bench import DATASET_ORDER, object_stream, run_mcos, scaled_w_d

WINDOWS = (250, 300, 350, 400)
METHODS = ("naive", "mfs", "ssg")


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("w0", WINDOWS)
@pytest.mark.parametrize("name", DATASET_ORDER)
def test_fig6(benchmark, name, w0, method):
    w, d = scaled_w_d(w0, 240)
    stream = object_stream(name)
    res = benchmark.pedantic(lambda: run_mcos(stream, method, w, d), rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"results": res["results"], "peak_states": res["peak_states"]}
    )
