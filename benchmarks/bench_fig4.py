"""Figure 4 — MCOS generation time vs total number of frames.

Paper setting: w=300, d=240, all six datasets, NAIVE / MFS / SSG.
The benchmark id encodes (dataset, frame fraction, method); the
measured time is the figure's y-value for that x-point.
"""
import pytest

from repro.bench import (
    DATASET_ORDER,
    dataset_frames,
    object_stream,
    run_mcos,
    scaled_w_d,
)

FRACTIONS = (0.25, 0.5, 0.75, 1.0)
METHODS = ("naive", "mfs", "ssg")


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("frac", FRACTIONS)
@pytest.mark.parametrize("name", DATASET_ORDER)
def test_fig4(benchmark, name, frac, method):
    w, d = scaled_w_d()
    total = dataset_frames(name)
    n = max(w + 1, int(total * frac))
    stream = object_stream(name, 0, total)[:n]
    res = benchmark.pedantic(lambda: run_mcos(stream, method, w, d), rounds=1, iterations=1)
    benchmark.extra_info.update(
        {"frames": n, "results": res["results"], "peak_states": res["peak_states"]}
    )
