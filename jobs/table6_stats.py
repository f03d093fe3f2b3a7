#!/usr/bin/env python
"""Table 6 — dataset statistics, computed by Spark SQL over VR.

Usage: ``spark-submit jobs/table6_stats.py`` (or plain python).
Prints our simulated datasets' statistics next to the paper's.
"""
import os as _os
import sys as _sys

_sys.path.insert(0, _os.path.dirname(_os.path.dirname(_os.path.abspath(__file__))))

import pandas as pd

from jobs._common import emit, get_spark, save_csv
from repro.bench import DATASET_ORDER, dataset_frames
from repro.bench import format_rows
from repro.spark.relation import table6_stats, vr_to_spark
from repro.videogen.datasets import PAPER_TABLE6, build_vr


def main() -> None:
    spark = get_spark("table6")
    vrs = {name: build_vr(name, n_frames=dataset_frames(name)) for name in DATASET_ORDER}
    vr_all = pd.concat([v.assign(camera=name) for name, v in vrs.items()])
    stats = table6_stats(
        spark,
        vr_to_spark(spark, vr_all),
        {name: dataset_frames(name) for name in DATASET_ORDER},
    ).toPandas().set_index("camera")
    rows = []
    for name in DATASET_ORDER:
        got = stats.loc[name]
        p = PAPER_TABLE6[name]
        rows.append(
            {
                "dataset": name,
                "frames": int(got["frames"]),
                "objects": int(got["objects"]),
                "obj_per_frame": round(float(got["obj_per_frame"]), 2),
                "occ_per_obj": round(float(got["occ_per_obj"]), 2),
                "frames_per_obj": round(float(got["frames_per_obj"]), 2),
                "paper_objects": p[1],
                "paper_obj_per_frame": p[2],
                "paper_occ_per_obj": p[3],
                "paper_frames_per_obj": p[4],
            }
        )
    emit("Table 6: dataset statistics (ours vs paper)", format_rows(rows))
    save_csv(rows, "table6.csv")
    spark.stop()


if __name__ == "__main__":
    main()
