"""VideoDecoder operator (§5.2.2).

In the paper this is OpenCV decoding a video file into RGB frames. Here
a "video" is its per-frame camera-configuration table (the visual
content is synthesized downstream by the detector from ground truth), so
decoding is the identity projection that materializes the frames stream
— but it keeps its place in the operator plan and charges the calibrated
per-frame decode cost, because the Road Visibility Pruner is placed
*after* it (§6.1: the decoder still touches every frame).
"""
from __future__ import annotations

from pyspark.sql import DataFrame

__all__ = ["decode"]

FRAME_COLS = [
    "video_id", "frame_idx", "ts", "cam_x", "cam_y", "cam_z",
    "qw", "qx", "qy", "qz", "fx", "fy", "sk", "x0", "y0",
    "img_w", "img_h", "cam_heading",
]


def decode(cameras: DataFrame) -> DataFrame:
    """Produce the frames stream from a GeospatialVideo's camera table."""
    return cameras.select(*FRAME_COLS)
