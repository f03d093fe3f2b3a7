"""Bounded (batch) query evaluation over VR with Spark.

Each camera's object stream is an independent sequential state
machine, so the natural Spark decomposition is
``groupBy("camera").applyInPandas(...)``: Catalyst plans the shuffle
that routes each camera's rows to one task, and the task runs the
paper's MCOS generation + CNFEvalE pipeline over the frames in order.
Scale-out is across cameras (and across query groups, which the
driver can submit concurrently).

Frames with no detections still advance the window; the per-camera
video length is threaded through ``n_frames`` so gaps in the fid
sequence are fed to the generator as empty frames.  Rows with
``oid = -1`` are treated as explicit empty-frame markers (used by the
streaming path, which cannot know the video length up front).
"""
from __future__ import annotations

from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.evaluate import QueryPipeline
from repro.core.queries import Query

RESULT_SCHEMA = (
    "camera string, fid long, qid long, objset string, n_frames long"
)
MCOS_SCHEMA = "camera string, fid long, objset string, n_frames long"

EMPTY_FRAME_OID = -1


def _frames_of_group(pdf: pd.DataFrame, n_frames: int | None) -> Iterable[tuple[int, list[tuple[int, str]]]]:
    """Yield ``(fid, [(oid, cls), ...])`` for every frame, in order,
    including empty frames up to ``n_frames`` (or max fid seen)."""
    by_fid: dict[int, list[tuple[int, str]]] = {}
    for row in pdf.itertuples(index=False):
        objs = by_fid.setdefault(int(row.fid), [])
        if int(row.oid) != EMPTY_FRAME_OID:
            objs.append((int(row.oid), row.cls))
    hi = (n_frames - 1) if n_frames is not None else (max(by_fid) if by_fid else -1)
    for fid in range(hi + 1):
        yield fid, by_fid.get(fid, [])


def evaluate_queries_batch(
    vr_df: DataFrame,
    queries: list[Query],
    *,
    w: int,
    d: int,
    method: str = "ssg",
    prune: bool = False,
    n_frames: int | None = None,
) -> DataFrame:
    """Match rows ``(camera, fid, qid, objset, n_frames)`` per §5.2.

    ``objset`` is the MCOS as a comma-joined oid string (kept scalar so
    results stay orderable for the DuckDB oracle)."""

    def run(pdf: pd.DataFrame) -> pd.DataFrame:
        camera = str(pdf["camera"].iloc[0])
        pipe = QueryPipeline(queries, w=w, d=d, method=method, prune=prune)
        rows = []
        for fid, objs in _frames_of_group(pdf, n_frames):
            for m in pipe.feed(fid, objs):
                rows.append(
                    (camera, m.fid, m.qid, ",".join(map(str, m.objset)), m.n_frames)
                )
        return pd.DataFrame(
            rows, columns=["camera", "fid", "qid", "objset", "n_frames"]
        )

    return vr_df.groupBy("camera").applyInPandas(run, RESULT_SCHEMA)


def mcos_batch(
    vr_df: DataFrame,
    *,
    w: int,
    d: int,
    method: str = "ssg",
    n_frames: int | None = None,
) -> DataFrame:
    """Query-less MCOS generation (§6.2): the satisfied Result State
    Set per frame as ``(camera, fid, objset, n_frames)`` rows."""
    from repro.core.evaluate import make_generator
    from repro.core.model import ObjSetCodec

    def run(pdf: pd.DataFrame) -> pd.DataFrame:
        camera = str(pdf["camera"].iloc[0])
        codec = ObjSetCodec()
        gen = make_generator(method, w, d)
        rows = []
        for fid, objs in _frames_of_group(pdf, n_frames):
            gen.advance(fid, codec.encode_iter(oid for oid, _ in objs))
            for mask, frames in gen.results().items():
                rows.append(
                    (camera, fid, ",".join(map(str, codec.decode(mask))), len(frames))
                )
        return pd.DataFrame(rows, columns=["camera", "fid", "objset", "n_frames"])

    return vr_df.groupBy("camera").applyInPandas(run, MCOS_SCHEMA)
