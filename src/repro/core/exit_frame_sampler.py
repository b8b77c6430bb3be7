"""§6.4 Exit Frame Sampler.

Uses the two inherited physical behaviors of vehicles — they follow
their lane's direction and travel at the assumed speed limit (25 mph) —
to skip tracker frames until the earliest of the three sampleEvents of
Listing 3:

  (i)  exitsLane:   the car's motion ray leaves its lane polygon;
  (ii) exitsCamera: the car's extrapolated position leaves the camera's
       per-frame viewable area (from §6.1's hulls);
  (iii) newCar:     a later frame has more detections than the current.

A car already inside an intersection (no containing lane) cannot be
extrapolated, so no frame is skipped. The skip is capped at
``MAX_SKIP`` = 13 frames — the accuracy/runtime knee of Fig. 4(c).

Runs as a cogrouped ``applyInPandas`` per video: detections (with 3D
locations) on one side, per-frame viewable hulls on the other; the lane
polygons ride along as a broadcast-sized Python list.
"""
from __future__ import annotations

import bisect

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import types as T

from repro.geo.polygon import as_poly_array, point_in_polygon, ray_exit_distance
from repro.world.agents import SPEED_LIMIT_MPS

__all__ = ["MAX_SKIP", "sample_frames_pandas", "sample_frames"]

MAX_SKIP = 13
VEHICLES = ("car", "truck")

SAMPLED_SCHEMA = T.StructType(
    [
        T.StructField("video_id", T.StringType()),
        T.StructField("frame_idx", T.LongType()),
    ]
)


def _containing_lane(x: float, y: float, lanes: list[tuple[np.ndarray, float]]):
    for poly, heading in lanes:
        if point_in_polygon(x, y, poly):
            return poly, heading
    return None


def sample_frames_pandas(
    dets: pd.DataFrame,
    hulls: pd.DataFrame,
    lanes: list[tuple[np.ndarray, float]],
    *,
    fps: float,
    speed: float = SPEED_LIMIT_MPS,
    max_skip: int | None = None,
) -> list[int]:
    """Run the sampling algorithm for one video; returns sampled frames.

    ``max_skip=None`` reads the module-level ``MAX_SKIP`` at call time
    (the Fig. 4c sweep varies it)."""
    if max_skip is None:
        max_skip = MAX_SKIP
    if not len(dets):
        return []
    by_frame = {int(f): g for f, g in dets.groupby("frame_idx")}
    frames = sorted(by_frame)
    hull_by_frame = {
        int(f): as_poly_array(h) for f, h in zip(hulls["frame_idx"], hulls["hull"])
    }
    counts = {f: len(g) for f, g in by_frame.items()}

    sampled: list[int] = []
    i = 0
    while i < len(frames):
        f = frames[i]
        sampled.append(f)
        g = by_frame[f]
        limit = f + max_skip
        next_f = limit
        # (iii) newCar: earliest later frame with more detections.
        for cand in frames[i + 1 :]:
            if cand > limit:
                break
            if counts[cand] > counts[f]:
                next_f = min(next_f, cand)
                break
        # Per-car events (i) and (ii).
        for _, det in g.iterrows():
            x, y = float(det["wx"]), float(det["wy"])
            lane = _containing_lane(x, y, lanes)
            if lane is None:
                # In an intersection: cannot assume straight motion.
                next_f = f + 1
                break
            poly, heading = lane
            # (i) exitsLane: last frame before the motion ray leaves the lane.
            d_exit = ray_exit_distance((x, y), heading, poly)
            if np.isfinite(d_exit):
                exit_frame = f + int(np.floor(d_exit / speed * fps))
                next_f = min(next_f, max(exit_frame, f + 1))
            # (ii) exitsCamera: extrapolate; first future frame out of view.
            h = np.deg2rad(heading)
            ks = np.arange(1, max_skip + 1)
            px = x + np.cos(h) * speed * ks / fps
            py = y + np.sin(h) * speed * ks / fps
            for k, (qx, qy) in zip(ks, zip(px, py)):
                hull = hull_by_frame.get(f + int(k))
                if hull is None or len(hull) < 3 or not point_in_polygon(qx, qy, hull):
                    next_f = min(next_f, max(f + int(k) - 1, f + 1))
                    break
            if next_f <= f + 1:
                break
        next_f = max(min(next_f, limit), f + 1)
        i = bisect.bisect_left(frames, next_f, lo=i + 1)
    return sampled


def sample_frames(
    dets3d: DataFrame,
    hulls: DataFrame,
    lanes: list[tuple[np.ndarray, float]],
    *,
    fps: float,
    speed: float = SPEED_LIMIT_MPS,
    max_skip: int | None = None,
) -> DataFrame:
    """ExitFrameSampler operator: (video_id, frame_idx) rows to keep."""

    def run(key, det_pdf: pd.DataFrame, hull_pdf: pd.DataFrame) -> pd.DataFrame:
        frames = sample_frames_pandas(
            det_pdf, hull_pdf, lanes, fps=fps, speed=speed, max_skip=max_skip
        )
        return pd.DataFrame({"video_id": key[0], "frame_idx": pd.array(frames, dtype="int64")})

    return (
        dets3d.groupBy("video_id")
        .cogroup(hulls.groupBy("video_id"))
        .applyInPandas(run, schema=SAMPLED_SCHEMA)
    )
