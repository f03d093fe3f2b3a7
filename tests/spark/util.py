"""Shared helpers for Spark-layer tests."""
from __future__ import annotations

import random

import pandas as pd


def synthetic_vr(
    *,
    cameras: tuple[str, ...] = ("cam0", "cam1"),
    n_frames: int = 60,
    n_objects: int = 8,
    labels: tuple[str, ...] = ("person", "car", "truck"),
    p_gap: float = 0.05,
    seed: int = 0,
) -> pd.DataFrame:
    """Small multi-camera VR relation with bursty object presence."""
    rng = random.Random(seed)
    rows = []
    for ci, camera in enumerate(cameras):
        label_of = {o: rng.choice(labels) for o in range(n_objects)}
        spans = {}
        for o in range(n_objects):
            a = rng.randrange(0, max(1, n_frames - 2))
            spans[o] = (a, a + max(2, int(rng.expovariate(1 / 10))))
        for fid in range(n_frames):
            if rng.random() < p_gap:
                continue  # frame with no detections
            for o, (a, b) in spans.items():
                if a <= fid <= b and rng.random() > 0.2:
                    rows.append((camera, fid, ci * 1000 + o, label_of[o]))
    return pd.DataFrame(rows, columns=["camera", "fid", "oid", "cls"])
