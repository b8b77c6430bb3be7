"""Tests for §6.4 Exit Frame Sampler."""
import numpy as np
import pandas as pd
import pytest

from repro.core.exit_frame_sampler import MAX_SKIP, sample_frames, sample_frames_pandas
from repro.geo.polygon import rect_polygon, ray_exit_distance
from repro.world.agents import SPEED_LIMIT_MPS

FPS = 12.0
BIG_HULL = rect_polygon(-1000, -1000, 1000, 1000).tolist()
LANE = (rect_polygon(0.0, -3.5, 200.0, 0.0), 0.0)  # long eastbound lane


def _dets(rows):
    """rows: list of (frame_idx, wx, wy)"""
    return pd.DataFrame(
        {
            "frame_idx": [r[0] for r in rows],
            "wx": [float(r[1]) for r in rows],
            "wy": [float(r[2]) for r in rows],
            "otype": "car",
        }
    )


def _hulls(n, hull=BIG_HULL):
    return pd.DataFrame({"frame_idx": range(n), "hull": [hull] * n})


def _car_rows(n, x0=10.0, speed=SPEED_LIMIT_MPS):
    return [(f, x0 + speed * f / FPS, -1.75) for f in range(n)]


def test_ray_exit_distance_in_lane():
    assert ray_exit_distance((10.0, -1.75), 0.0, LANE[0]) == pytest.approx(190.0)
    assert ray_exit_distance((10.0, -1.75), 90.0, LANE[0]) == pytest.approx(1.75)


def test_far_from_exit_samples_max_skip():
    # Car mid-lane: exitsLane is ~200 frames away; samples every MAX_SKIP.
    dets = _dets(_car_rows(40))
    sampled = sample_frames_pandas(dets, _hulls(40), [LANE], fps=FPS)
    assert sampled[0] == 0
    assert sampled[1] == MAX_SKIP
    diffs = np.diff(sampled)
    assert (diffs == MAX_SKIP).all()


def test_exits_lane_event_samples_before_exit():
    # Car 5 m from the lane end at 25 mph: exits after ~5.4 frames.
    dets = _dets([(f, 195.0 + SPEED_LIMIT_MPS * f / FPS, -1.75) for f in range(12)])
    sampled = sample_frames_pandas(dets, _hulls(12), [LANE], fps=FPS)
    expected = int(np.floor(5.0 / SPEED_LIMIT_MPS * FPS))  # frame 5
    assert sampled[1] == expected


def test_car_in_intersection_no_skip():
    # Car outside any lane (in an intersection): every frame sampled.
    dets = _dets([(f, 300.0, 50.0) for f in range(6)])
    sampled = sample_frames_pandas(dets, _hulls(6), [LANE], fps=FPS)
    assert sampled == [0, 1, 2, 3, 4, 5]


def test_exits_camera_event():
    # Hull only covers x < 20: the car leaves the view after ~10 frames.
    hull = rect_polygon(-10, -10, 20, 10).tolist()
    dets = _dets(_car_rows(30))
    sampled = sample_frames_pandas(dets, _hulls(30, hull), [LANE], fps=FPS)
    # Car at x=10+0.93f: leaves hull (x>20) at f~=11 -> sample f=10.
    assert sampled[1] in (9, 10)


def test_new_car_event():
    # A second car appears at frame 4: sampling must include frame 4.
    rows = _car_rows(30)
    rows += [(f, 50.0, -1.75) for f in range(4, 30)]
    dets = _dets(rows)
    sampled = sample_frames_pandas(dets, _hulls(30), [LANE], fps=FPS)
    assert 4 in sampled


def test_missing_hull_stops_skip():
    # Frames 5.. have no hull rows (e.g. pruned upstream): the car "exits
    # the camera" at frame 5, so frame 4 is sampled.
    dets = _dets(_car_rows(20))
    hulls = _hulls(5)
    sampled = sample_frames_pandas(dets, hulls, [LANE], fps=FPS)
    assert sampled[1] == 4


def test_empty_dets():
    assert sample_frames_pandas(_dets([]), _hulls(5), [LANE], fps=FPS) == []


def test_always_advances():
    # Pathological inputs can never loop forever: strictly increasing.
    dets = _dets([(f, 0.0, 0.0) for f in range(10)])  # on lane corner
    sampled = sample_frames_pandas(dets, _hulls(10), [LANE], fps=FPS)
    assert all(b > a for a, b in zip(sampled, sampled[1:]))


def test_reduction_fraction_reasonable():
    # A single cruising car: EFS should skip the large majority of
    # frames (paper: per-frame tracking runtime drops to ~28-39 %).
    dets = _dets(_car_rows(120, x0=5.0))
    sampled = sample_frames_pandas(dets, _hulls(120), [LANE], fps=FPS)
    assert len(sampled) <= 120 / 8


def test_sample_frames_spark(spark):
    dets = _dets(_car_rows(40))
    dets["video_id"] = "v0"
    hulls = _hulls(40)
    hulls["video_id"] = "v0"
    out = sample_frames(
        spark.createDataFrame(dets),
        spark.createDataFrame(hulls),
        [LANE],
        fps=FPS,
    ).toPandas()
    assert list(out["frame_idx"]) == sample_frames_pandas(dets, hulls, [LANE], fps=FPS)
    assert (out["video_id"] == "v0").all()
