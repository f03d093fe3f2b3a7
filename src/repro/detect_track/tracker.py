"""Greedy-IoU multi-object tracker ("Deep-SORT-lite").

Associates per-frame detections to persistent track ids with the same
mechanics Deep SORT uses at a high level: motion-predicted boxes,
class-gated IoU association (greedy, highest IoU first), new tracks
for unmatched detections, and deletion after ``max_age`` frames
unseen.  Short occlusions therefore keep the id (a *gap* in the
track's frame set — the paper's occlusion count), while long ones
produce id churn, exactly the imperfections the duration parameter
``d`` exists to tolerate.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

import pandas as pd

from repro.detect_track.detector import Detection, Detector, DetectorConfig, iou
from repro.videogen.scene import GTObject, Scene


@dataclass(frozen=True)
class TrackerConfig:
    iou_min: float = 0.2  # association gate
    max_age: int = 25  # frames a track survives unseen
    vel_smooth: float = 0.6  # EMA factor for velocity updates


@dataclass
class _Track:
    tid: int
    label: str
    x: float
    y: float
    w: float
    h: float
    vx: float
    vy: float
    last_seen: int


class Tracker:
    """Feed detections frame by frame; collects ``(fid, tid, label)``."""

    def __init__(self, cfg: TrackerConfig = TrackerConfig()) -> None:
        self.cfg = cfg
        self._tracks: list[_Track] = []
        self._next_tid = 0

    def update(self, fid: int, detections: list[Detection]) -> list[tuple[int, int, str]]:
        cfg = self.cfg
        # predict
        for t in self._tracks:
            t.x += t.vx
            t.y += t.vy
        # class-gated greedy IoU association
        pairs: list[tuple[float, int, int]] = []
        for di, det in enumerate(detections):
            for ti, t in enumerate(self._tracks):
                if t.label != det.label:
                    continue
                score = iou(det.box, (t.x, t.y, t.w, t.h))
                if score >= cfg.iou_min:
                    pairs.append((score, di, ti))
        pairs.sort(reverse=True)
        used_d: set[int] = set()
        used_t: set[int] = set()
        out: list[tuple[int, int, str]] = []
        for score, di, ti in pairs:
            if di in used_d or ti in used_t:
                continue
            used_d.add(di)
            used_t.add(ti)
            t = self._tracks[ti]
            x, y, w, h = detections[di].box
            a = cfg.vel_smooth
            t.vx = a * t.vx + (1 - a) * (x - t.x)
            t.vy = a * t.vy + (1 - a) * (y - t.y)
            t.x, t.y, t.w, t.h = x, y, w, h
            t.last_seen = fid
            out.append((fid, t.tid, t.label))
        for di, det in enumerate(detections):
            if di in used_d:
                continue
            x, y, w, h = det.box
            t = _Track(self._next_tid, det.label, x, y, w, h, 0.0, 0.0, fid)
            self._next_tid += 1
            self._tracks.append(t)
            out.append((fid, t.tid, t.label))
        self._tracks = [t for t in self._tracks if fid - t.last_seen <= cfg.max_age]
        return out

    @property
    def n_tracks_created(self) -> int:
        return self._next_tid


def run_pipeline(
    scene: Scene | Iterable[tuple[int, list[GTObject]]],
    *,
    detector: Detector | None = None,
    tracker: Tracker | None = None,
    camera: str = "cam0",
) -> pd.DataFrame:
    """Scene -> detector -> tracker -> VR relation.

    Returns the structured relation of the paper's first layer with
    schema ``(camera, fid, oid, cls)``.  Every frame is represented; a
    frame with no surviving detections simply contributes no rows.
    """
    detector = detector or Detector()
    tracker = tracker or Tracker()
    rows: list[tuple[str, int, int, str]] = []
    for fid, objects in scene:
        for _, tid, label in tracker.update(fid, detector.detect(objects)):
            rows.append((camera, fid, tid, label))
    return pd.DataFrame(rows, columns=["camera", "fid", "oid", "cls"])
