"""Shared helpers for core-algorithm tests."""
from __future__ import annotations

import random

from repro.core.model import ObjSetCodec


def letters_stream(frames: list[str]) -> list[tuple[int, list[int]]]:
    """Turn ['B', 'ABC', ...] into a (fid, [oid,...]) stream where each
    letter is an object id (ord value) — matches the paper's examples."""
    return [(i, [ord(ch) for ch in s]) for i, s in enumerate(frames)]


def encode_stream(
    frames: list[tuple[int, list[int]]], codec: ObjSetCodec | None = None
) -> tuple[ObjSetCodec, list[tuple[int, int]]]:
    codec = codec if codec is not None else ObjSetCodec()
    return codec, [(fid, codec.encode_iter(oids)) for fid, oids in frames]


def random_stream(
    n_frames: int,
    *,
    n_objects: int = 8,
    p_present: float = 0.45,
    p_gap: float = 0.0,
    seed: int = 0,
) -> list[tuple[int, list[int]]]:
    """Random object stream; p_gap controls empty frames."""
    rng = random.Random(seed)
    out = []
    for fid in range(n_frames):
        if rng.random() < p_gap:
            out.append((fid, []))
            continue
        objs = [o for o in range(n_objects) if rng.random() < p_present]
        out.append((fid, objs))
    return out


def bursty_stream(
    n_frames: int,
    *,
    n_objects: int = 10,
    dwell: int = 6,
    occl: float = 0.15,
    seed: int = 0,
) -> list[tuple[int, list[int]]]:
    """Objects dwell for contiguous runs with occlusion dropouts —
    closer to real video streams than i.i.d. presence."""
    rng = random.Random(seed)
    spans = {}
    for o in range(n_objects):
        start = rng.randrange(0, max(1, n_frames - 1))
        spans[o] = (start, start + max(1, int(rng.expovariate(1 / dwell))))
    out = []
    for fid in range(n_frames):
        objs = [
            o
            for o, (a, b) in spans.items()
            if a <= fid <= b and rng.random() > occl
        ]
        out.append((fid, objs))
    return out
