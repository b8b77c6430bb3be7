"""§5.2.4 Output Composer.

``get_objects`` returns the distinct Movable Objects of the filtered
World; ``save_videos`` composes the matching frames into contiguous
video-snippet manifests (video_id, start/end frame, frame count) — the
information content of the paper's annotated snippet files (no video
codec in this environment; the substitution is documented in DESIGN.md).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

__all__ = ["get_objects", "save_videos", "snippet_manifest"]


def get_objects(result: DataFrame, pred) -> DataFrame:
    """Distinct Movable Objects appearing in the query result.

    One row per (video, object): oid, type, first/last frame of the
    matched period.
    """
    from repro.core.predicates import object_refs

    parts = []
    for r in object_refs(pred):
        parts.append(
            result.select(
                "video_id",
                F.col(f"oid_{r.idx}").alias("oid"),
                F.col(f"otype_{r.idx}").alias("otype"),
                "frame_idx",
            )
        )
    un = parts[0]
    for p in parts[1:]:
        un = un.unionByName(p)
    return (
        un.groupBy("video_id", "oid", "otype")
        .agg(
            F.min("frame_idx").alias("first_frame"),
            F.max("frame_idx").alias("last_frame"),
            F.count("*").alias("n_frames"),
        )
        .orderBy("video_id", "oid")
    )


def snippet_manifest(result: DataFrame) -> DataFrame:
    """Group matched frames into contiguous per-video snippets."""
    frames = result.select("video_id", "frame_idx").distinct()
    w = Window.partitionBy("video_id").orderBy("frame_idx")
    grouped = frames.withColumn(
        "snippet_key", F.col("frame_idx") - F.row_number().over(w)
    )
    return (
        grouped.groupBy("video_id", "snippet_key")
        .agg(
            F.min("frame_idx").alias("start_frame"),
            F.max("frame_idx").alias("end_frame"),
            F.count("*").alias("n_frames"),
        )
        .drop("snippet_key")
        .orderBy("video_id", "start_frame")
    )


def save_videos(result: DataFrame, path: str | None = None) -> DataFrame:
    """Write (or return) the snippet manifest; one row per snippet."""
    manifest = snippet_manifest(result)
    if path is not None:
        manifest.write.mode("overwrite").parquet(path)
    return manifest
