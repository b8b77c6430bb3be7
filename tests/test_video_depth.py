"""Tests for the Monodepth2 simulation (ML 3D location estimator)."""
import numpy as np
import pytest

from repro.video.depth import DEPTH_GRID, FAR_M, depth_map, estimate_3d_depth, _estimate_frame
from repro.video.detector import project_detections
from tests.helpers import joined_frame_objects, make_frames, make_gt


def _dets(objs, n_frames=1, **kw):
    frames = make_frames(n_frames, **kw)
    gt = make_gt(objs, n_frames)
    return project_detections(joined_frame_objects(frames, gt))


def test_depth_map_shape_and_monotone():
    cam = make_frames(1).iloc[0]
    dm = depth_map(cam)
    gw, gh = DEPTH_GRID
    assert dm.shape == (gh, gw)
    # Sky (top rows) is far; ground near the bottom is close.
    assert (dm[0] == FAR_M).all()
    assert dm[-1].min() < 10.0
    # Ground depth increases toward the horizon.
    col = dm[:, gw // 2]
    ground = col[col < FAR_M]
    assert (np.diff(ground) <= 1e-9).all()  # deeper rows are nearer


def test_estimate_frame_location_accuracy():
    det = _dets([dict(oid=1, otype="car", x=20, y=0)])
    out = _estimate_frame(det)
    r = out.iloc[0]
    # Bottom-center ray at ~true depth: within ~8 % of the true location.
    assert r["wx"] == pytest.approx(20.0, rel=0.15)
    assert abs(r["wy"]) < 2.0
    assert r["wz"] >= 0.0
    assert r["est_src"] == "depth"


def test_estimate_frame_noise_is_deterministic():
    det = _dets([dict(oid=1, otype="car", x=30, y=1)])
    a = _estimate_frame(det)
    b = _estimate_frame(det)
    assert a["wx"].iloc[0] == b["wx"].iloc[0]


def test_estimate_frame_noise_varies_by_frame():
    det = _dets([dict(oid=1, otype="car", x=30, y=1)], n_frames=8)
    out = _estimate_frame(det.copy())  # all rows same camera; per-row noise
    assert out["wx"].nunique() > 1


def test_depth_overestimates_elevated_objects_distance_not_crashing():
    det = _dets([dict(oid=1, otype="traffic light", x=20, y=0, z=2.5)])
    if len(det):
        out = _estimate_frame(det)
        assert np.isfinite(out[["wx", "wy", "wz"]].to_numpy()).all()


def test_estimate_3d_depth_spark(spark):
    det = _dets(
        [dict(oid=1, otype="car", x=20, y=0), dict(oid=2, otype="car", x=35, y=2)], n_frames=4
    )
    sdf = spark.createDataFrame(det)
    out = estimate_3d_depth(sdf).toPandas()
    assert len(out) == len(det)
    assert {"wx", "wy", "wz", "est_src"} <= set(out.columns)
    assert (out["est_src"] == "depth").all()
    near = out[out["gt_oid"] == 1]["wx"]
    far = out[out["gt_oid"] == 2]["wx"]
    assert near.mean() < far.mean()
