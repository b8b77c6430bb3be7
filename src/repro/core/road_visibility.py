"""§6.1 Road Visibility Pruner.

Per frame: (1) compute the camera's 3D viewable pyramid at the pruning
distance d (Eq. 6) and project it to the z=0 plane; (2) take the convex
hull of apex + 4 corners — the 2D viewable area; (3) spatially join the
viewable area with the Geographic Constructs of the types named in the
filter's ``contains`` predicates; (4) keep the frame only if every such
type is visible.

Spark shape: a vectorized ``mapInPandas`` computes per-frame hull
vertices and a hull bbox; the join against road polygons uses the bbox
range predicates first (the Catalyst-optimizable "spatial index"
pre-filter) and the exact convex SAT test second; a groupBy + semi-join
filters the frames stream.
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.geo.camera import intrinsic_matrix, view_hull_points
from repro.geo.polygon import convex_hull, convex_intersects

__all__ = ["frame_view_hulls", "visible_construct_types", "prune_frames"]

HULL_SCHEMA = T.StructType(
    [
        T.StructField("video_id", T.StringType()),
        T.StructField("frame_idx", T.LongType()),
        T.StructField("hull", T.ArrayType(T.ArrayType(T.DoubleType()))),
        T.StructField("hxmin", T.DoubleType()),
        T.StructField("hymin", T.DoubleType()),
        T.StructField("hxmax", T.DoubleType()),
        T.StructField("hymax", T.DoubleType()),
    ]
)


def hulls_pandas(pdf: pd.DataFrame, distance: float) -> pd.DataFrame:
    """Per-frame 2D viewable-area hulls for a chunk of frames."""
    n = len(pdf)
    t = pdf[["cam_x", "cam_y", "cam_z"]].to_numpy(np.float64)
    q = pdf[["qw", "qx", "qy", "qz"]].to_numpy(np.float64)
    k = intrinsic_matrix(
        pdf["fx"].to_numpy(), pdf["fy"].to_numpy(), pdf["sk"].to_numpy(),
        pdf["x0"].to_numpy(), pdf["y0"].to_numpy(),
    )
    pts = view_hull_points(t, q, k, pdf["img_w"].to_numpy(), pdf["img_h"].to_numpy(), distance)
    hulls = [convex_hull(pts[i]) for i in range(n)]
    return pd.DataFrame(
        {
            "video_id": pdf["video_id"].to_numpy(),
            "frame_idx": pdf["frame_idx"].to_numpy(np.int64),
            "hull": [h.tolist() for h in hulls],
            "hxmin": [p[:, 0].min() for p in pts],
            "hymin": [p[:, 1].min() for p in pts],
            "hxmax": [p[:, 0].max() for p in pts],
            "hymax": [p[:, 1].max() for p in pts],
        }
    )


def frame_view_hulls(frames: DataFrame, distance: float) -> DataFrame:
    """Viewable-area polygon (and its bbox) for every frame."""

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf):
                yield hulls_pandas(pdf, distance)

    return frames.mapInPandas(run, schema=HULL_SCHEMA)


def visible_construct_types(
    frames: DataFrame, road: DataFrame, geo_types: set[str], distance: float
) -> DataFrame:
    """(video_id, frame_idx, type) rows for every construct type of
    interest visible in the frame's viewable area."""
    hulls = frame_view_hulls(frames, distance)
    cand = road.filter(F.col("type").isin(*[str(t) for t in geo_types]))
    # Spatial-index surrogate: bbox-overlap range join (Catalyst handles
    # this as a plain theta-join with pushed range predicates).
    joined = hulls.join(
        cand,
        (F.col("hxmin") <= F.col("xmax"))
        & (F.col("hxmax") >= F.col("xmin"))
        & (F.col("hymin") <= F.col("ymax"))
        & (F.col("hymax") >= F.col("ymin")),
        "inner",
    ).select("video_id", "frame_idx", "hull", "poly", "type")

    schema = T.StructType(
        [
            T.StructField("video_id", T.StringType()),
            T.StructField("frame_idx", T.LongType()),
            T.StructField("type", T.StringType()),
        ]
    )

    def exact(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if not len(pdf):
                continue
            keep = [
                convex_intersects(h, p) for h, p in zip(pdf["hull"], pdf["poly"])
            ]
            out = pdf.loc[keep, ["video_id", "frame_idx", "type"]]
            if len(out):
                yield out

    return joined.mapInPandas(exact, schema=schema).dropDuplicates(
        ["video_id", "frame_idx", "type"]
    )


def prune_frames(
    frames: DataFrame, road: DataFrame, geo_types: set[str], distance: float
) -> DataFrame:
    """Keep only frames where *every* construct type of interest is
    visible (the transformed top-level conjunction of §6.1.2)."""
    if not geo_types:
        return frames
    vis = visible_construct_types(frames, road, geo_types, distance)
    ok = (
        vis.groupBy("video_id", "frame_idx")
        .agg(F.countDistinct("type").alias("n_types"))
        .filter(F.col("n_types") == len(geo_types))
        .select("video_id", "frame_idx")
    )
    return frames.join(ok, on=["video_id", "frame_idx"], how="leftsemi")
