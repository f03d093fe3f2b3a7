"""Synthetic object detector over simulated ground truth.

Mimics a Faster-R-CNN-style per-frame detector: it emits a (jittered)
box and class per object, *missing* objects that are invisible in
ground truth, geometrically occluded by a nearer box, or dropped by
random detector noise.  No object identity is emitted — identity is
the tracker's job, as in the paper's architecture.
"""
from __future__ import annotations

import random
from dataclasses import dataclass

from repro.videogen.scene import GTObject

Box = tuple[float, float, float, float]


def iou(a: Box, b: Box) -> float:
    """Intersection-over-union of two ``(x, y, w, h)`` boxes."""
    ax, ay, aw, ah = a
    bx, by, bw, bh = b
    ix = max(0.0, min(ax + aw, bx + bw) - max(ax, bx))
    iy = max(0.0, min(ay + ah, by + bh) - max(ay, by))
    inter = ix * iy
    if inter <= 0:
        return 0.0
    return inter / (aw * ah + bw * bh - inter)


def cover_fraction(a: Box, b: Box) -> float:
    """Fraction of box ``a`` covered by box ``b``."""
    ax, ay, aw, ah = a
    bx, by, bw, bh = b
    ix = max(0.0, min(ax + aw, bx + bw) - max(ax, bx))
    iy = max(0.0, min(ay + ah, by + bh) - max(ay, by))
    return (ix * iy) / (aw * ah) if aw * ah > 0 else 0.0


@dataclass(frozen=True)
class Detection:
    label: str
    box: Box


@dataclass(frozen=True)
class DetectorConfig:
    p_miss: float = 0.02  # random detector dropout
    occ_cover: float = 0.65  # covered fraction that hides an object
    jitter: float = 2.0  # px noise on box coordinates
    seed: int = 0


class Detector:
    """Stateless per-frame detector (state is only the noise RNG)."""

    def __init__(self, cfg: DetectorConfig = DetectorConfig()) -> None:
        self.cfg = cfg
        self._rng = random.Random(cfg.seed * 104729 + 7)

    def detect(self, objects: list[GTObject]) -> list[Detection]:
        cfg, rng = self.cfg, self._rng
        out: list[Detection] = []
        # Depth ordering: larger bottom edge = nearer to the camera.
        for o in objects:
            if not o.visible:
                continue
            covered = 0.0
            for other in objects:
                if other.oid == o.oid or not other.visible:
                    continue
                if other.y + other.h > o.y + o.h:  # other is nearer
                    covered = max(covered, cover_fraction(o.box, other.box))
            if covered >= cfg.occ_cover:
                continue
            if rng.random() < cfg.p_miss:
                continue
            j = cfg.jitter
            out.append(
                Detection(
                    o.label,
                    (
                        o.x + rng.gauss(0, j),
                        o.y + rng.gauss(0, j),
                        max(4.0, o.w + rng.gauss(0, j)),
                        max(4.0, o.h + rng.gauss(0, j)),
                    ),
                )
            )
        return out
