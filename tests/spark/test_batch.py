"""Batch Spark pipeline vs the pure-Python reference and SQL oracles."""
from __future__ import annotations

import pandas as pd
import pytest

from repro.core.evaluate import evaluate_stream
from repro.core.queries import Condition, Query, geq_only_queries, random_cnf_queries
from repro.oracle import assert_equivalent
from repro.spark.batch import evaluate_queries_batch, mcos_batch
from repro.spark.relation import vr_to_spark
from tests.spark.util import synthetic_vr

N_FRAMES = 60


@pytest.fixture(scope="module")
def vr_pdf():
    return synthetic_vr(n_frames=N_FRAMES, seed=7)


def _reference_rows(vr_pdf, queries, w, d, method="naive", prune=False):
    """Drive the pure-Python pipeline per camera (no Spark)."""
    rows = []
    for camera, grp in vr_pdf.groupby("camera"):
        by_fid = {
            fid: list(zip(g["oid"].astype(int), g["cls"]))
            for fid, g in grp.groupby("fid")
        }
        stream = [(fid, by_fid.get(fid, [])) for fid in range(N_FRAMES)]
        for m in evaluate_stream(stream, queries, w=w, d=d, method=method, prune=prune):
            rows.append(
                (camera, m.fid, m.qid, ",".join(map(str, m.objset)), m.n_frames)
            )
    return sorted(rows)


@pytest.mark.parametrize("method", ["naive", "mfs", "ssg"])
def test_batch_matches_pure_python(spark, vr_pdf, method):
    queries = random_cnf_queries(12, seed=1, labels=("person", "car", "truck"))
    got = evaluate_queries_batch(
        vr_to_spark(spark, vr_pdf), queries, w=10, d=5, method=method,
        n_frames=N_FRAMES,
    )
    got_rows = sorted(tuple(r) for r in got.collect())
    assert got_rows == _reference_rows(vr_pdf, queries, 10, 5, method)
    assert got_rows, "workload produced no matches — weak test"


def test_batch_methods_agree(spark, vr_pdf):
    queries = random_cnf_queries(15, seed=2, labels=("person", "car", "truck"))
    outs = [
        sorted(
            tuple(r)
            for r in evaluate_queries_batch(
                vr_to_spark(spark, vr_pdf), queries, w=12, d=6, method=m,
                n_frames=N_FRAMES,
            ).collect()
        )
        for m in ("naive", "mfs", "ssg")
    ]
    assert outs[0] == outs[1] == outs[2]


def test_batch_pruned_matches_unpruned(spark, vr_pdf):
    queries = geq_only_queries(20, n_min=1, seed=3, labels=("person", "car", "truck"))
    a = sorted(
        tuple(r)
        for r in evaluate_queries_batch(
            vr_to_spark(spark, vr_pdf), queries, w=10, d=4, method="ssg",
            prune=False, n_frames=N_FRAMES,
        ).collect()
    )
    b = sorted(
        tuple(r)
        for r in evaluate_queries_batch(
            vr_to_spark(spark, vr_pdf), queries, w=10, d=4, method="ssg",
            prune=True, n_frames=N_FRAMES,
        ).collect()
    )
    assert a == b


def test_mcos_batch_d_equals_w_sql_oracle(spark):
    """For ``d = w`` the satisfied MCOS per window is exactly the set
    of objects present in all ``w`` frames — checked in pure SQL via
    the DuckDB oracle (gap-free stream so windows are well-defined)."""
    vr_pdf = synthetic_vr(n_frames=40, p_gap=0.0, seed=11)
    w = 6
    got = mcos_batch(vr_to_spark(spark, vr_pdf), w=w, d=w, method="ssg", n_frames=40)
    # explode our objset string back to (camera, win_end, oid) rows
    exploded = []
    for r in got.collect():
        for oid in r.objset.split(","):
            exploded.append((r.camera, r.fid, int(oid)))
    got_df = spark.createDataFrame(
        pd.DataFrame(exploded, columns=["camera", "win_end", "oid"])
    )
    assert_equivalent(
        got_df,
        f"""
        SELECT a.camera AS camera, a.fid AS win_end, b.oid AS oid
        FROM (SELECT DISTINCT camera, fid FROM vr) a
        JOIN vr b ON a.camera = b.camera
                 AND b.fid BETWEEN a.fid - {w - 1} AND a.fid
        WHERE a.fid >= {w - 1}
        GROUP BY a.camera, a.fid, b.oid
        HAVING COUNT(DISTINCT b.fid) = {w}
        """,
        vr=vr_pdf,
    )


@pytest.mark.parametrize("method", ["naive", "mfs", "ssg"])
def test_mcos_batch_methods_agree(spark, vr_pdf, method):
    ref = sorted(
        tuple(r)
        for r in mcos_batch(
            vr_to_spark(spark, vr_pdf), w=9, d=4, method="naive", n_frames=N_FRAMES
        ).collect()
    )
    got = sorted(
        tuple(r)
        for r in mcos_batch(
            vr_to_spark(spark, vr_pdf), w=9, d=4, method=method, n_frames=N_FRAMES
        ).collect()
    )
    assert got == ref
    assert ref, "no satisfied states — weak test"


def test_batch_multi_camera_isolation(spark):
    """Cameras must not share object or window state: evaluating two
    cameras together equals evaluating each alone."""
    vr_pdf = synthetic_vr(cameras=("a", "b"), n_frames=40, seed=5)
    queries = [Query(0, ((Condition("car", ">=", 1),),))]
    both = sorted(
        tuple(r)
        for r in evaluate_queries_batch(
            vr_to_spark(spark, vr_pdf), queries, w=8, d=3, n_frames=40
        ).collect()
    )
    solo = []
    for cam in ("a", "b"):
        solo.extend(
            tuple(r)
            for r in evaluate_queries_batch(
                vr_to_spark(spark, vr_pdf[vr_pdf.camera == cam]),
                queries, w=8, d=3, n_frames=40,
            ).collect()
        )
    assert both == sorted(solo)
