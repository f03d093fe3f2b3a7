"""Table 6 — dataset statistics of the six video profiles.

Benchmarks the detection+tracking substrate building each VR relation;
the produced statistics are attached as ``extra_info`` so
``bench_output.txt`` records our Table 6 next to the timings.
"""
import pytest

from repro.bench import DATASET_ORDER, dataset_frames
from repro.videogen.datasets import PAPER_TABLE6, build_vr, vr_stats


@pytest.mark.parametrize("name", DATASET_ORDER)
def test_table6(benchmark, name):
    n = dataset_frames(name)

    def run():
        vr = build_vr(name, n_frames=n)
        return vr_stats(vr, n)

    stats = benchmark.pedantic(run, rounds=1, iterations=1)
    paper = PAPER_TABLE6[name]
    benchmark.extra_info.update(
        {
            "ours": stats,
            "paper": {
                "frames": paper[0],
                "objects": paper[1],
                "obj_per_frame": paper[2],
                "occ_per_obj": paper[3],
                "frames_per_obj": paper[4],
            },
        }
    )
    assert stats["objects"] > 0
