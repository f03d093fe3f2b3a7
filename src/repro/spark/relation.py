"""The structured relation VR and its Table 6 statistics in Spark SQL.

``VR(camera, fid, oid, cls)`` is the output of the detection/tracking
layer (paper §3).  ``TABLE6_SQL`` computes the dataset statistics of
the paper's Table 6 per camera; the same SQL string runs on DuckDB in
tests via ``repro.oracle.assert_equivalent``, so the Spark plan is
checked for result correctness, not just execution.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

VR_SCHEMA = T.StructType(
    [
        T.StructField("camera", T.StringType(), False),
        T.StructField("fid", T.LongType(), False),
        T.StructField("oid", T.LongType(), False),
        T.StructField("cls", T.StringType(), False),
    ]
)

# Frames counts every fid of the underlying video; detections carry
# only non-empty frames, so the video length is supplied per camera
# through the ``vr_len(camera, n_frames)`` relation.
TABLE6_SQL = """
WITH lagged AS (
    SELECT camera, oid, fid,
           LAG(fid) OVER (PARTITION BY camera, oid ORDER BY fid) AS prev_fid
    FROM vr
),
per_obj AS (
    SELECT camera, oid,
           COUNT(*) AS n_frames_obj,
           SUM(CASE WHEN prev_fid IS NOT NULL AND fid - prev_fid > 1
                    THEN 1 ELSE 0 END) AS n_gaps
    FROM lagged
    GROUP BY camera, oid
),
per_cam AS (
    SELECT camera,
           SUM(n_frames_obj) AS rows_total,
           COUNT(*) AS objects,
           AVG(CAST(n_gaps AS DOUBLE)) AS occ_per_obj,
           AVG(CAST(n_frames_obj AS DOUBLE)) AS frames_per_obj
    FROM per_obj
    GROUP BY camera
)
SELECT p.camera AS camera,
       CAST(l.n_frames AS BIGINT) AS frames,
       CAST(p.objects AS BIGINT) AS objects,
       CAST(p.rows_total AS DOUBLE) / l.n_frames AS obj_per_frame,
       p.occ_per_obj AS occ_per_obj,
       CAST(p.rows_total AS DOUBLE) / p.objects AS frames_per_obj
FROM per_cam p JOIN vr_len l ON p.camera = l.camera
"""


def vr_to_spark(spark: SparkSession, vr: pd.DataFrame) -> DataFrame:
    """Lift a pandas VR relation into a Spark DataFrame."""
    pdf = vr.astype({"camera": str, "fid": "int64", "oid": "int64", "cls": str})
    return spark.createDataFrame(pdf[["camera", "fid", "oid", "cls"]], VR_SCHEMA)


def table6_stats(
    spark: SparkSession, vr_df: DataFrame, n_frames: dict[str, int]
) -> DataFrame:
    """Table 6 statistics per camera, computed by Catalyst."""
    vr_df.createOrReplaceTempView("vr")
    spark.createDataFrame(
        pd.DataFrame(
            [(c, int(n)) for c, n in n_frames.items()],
            columns=["camera", "n_frames"],
        )
    ).createOrReplaceTempView("vr_len")
    return spark.sql(TABLE6_SQL)


def class_counts_per_frame(vr_df: DataFrame) -> DataFrame:
    """Per-frame per-class object counts — the aggregate the query
    layer consumes (paper §5.2 step 2a), at relation level."""
    return (
        vr_df.groupBy("camera", "fid", "cls")
        .agg(F.count_distinct("oid").alias("n"))
    )


def full_presence_mcos(vr_df: DataFrame, w: int) -> DataFrame:
    """The ``d = w`` special case, expressible in pure SQL: for every
    window ending at ``fid``, the objects present in *all* ``w`` frames
    of the window — i.e. the unique MCOS with full support.  Used as a
    relational oracle for the state-machine pipelines.

    Note this counts only windows whose ``w`` frames all contain the
    object, which matches the generators' output exactly when every
    frame in the window is non-empty.
    """
    spark = vr_df.sparkSession
    vr_df.createOrReplaceTempView("vr_fp")
    return spark.sql(f"""
        SELECT a.camera AS camera, a.fid AS win_end, b.oid AS oid
        FROM (SELECT DISTINCT camera, fid FROM vr_fp) a
        JOIN vr_fp b
          ON a.camera = b.camera
         AND b.fid BETWEEN a.fid - {w - 1} AND a.fid
        WHERE a.fid >= {w - 1}
        GROUP BY a.camera, a.fid, b.oid
        HAVING COUNT(DISTINCT b.fid) = {w}
    """)
