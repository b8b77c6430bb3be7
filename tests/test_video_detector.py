"""Tests for the synthetic object detector."""
import numpy as np
import pandas as pd
import pytest

from repro.video.detector import (
    CAMERA_COLS,
    DET_SCHEMA,
    detect,
    project_detections,
    pseudo_uniform,
)
from tests.helpers import joined_frame_objects, make_frames, make_gt


def _detect_pdf(objs, n_frames=1, **frame_kw):
    frames = make_frames(n_frames, **frame_kw)
    gt = make_gt(objs, n_frames)
    return project_detections(joined_frame_objects(frames, gt))


def test_pseudo_uniform_deterministic_and_ranged():
    a = pseudo_uniform(np.arange(1000), salt=1)
    b = pseudo_uniform(np.arange(1000), salt=1)
    np.testing.assert_array_equal(a, b)
    assert (a >= 0).all() and (a < 1).all()
    assert 0.4 < a.mean() < 0.6  # roughly uniform


def test_pseudo_uniform_salt_changes_stream():
    a = pseudo_uniform(np.arange(100), salt=1)
    b = pseudo_uniform(np.arange(100), salt=2)
    assert not np.array_equal(a, b)


def test_visible_car_detected():
    det = _detect_pdf([dict(oid=1, otype="car", x=20, y=0)])
    assert len(det) == 1
    r = det.iloc[0]
    assert r["gt_oid"] == 1
    assert r["x1"] < 800 < r["x2"]  # centered horizontally
    assert r["x2"] - r["x1"] > 20
    assert r["gt_zcam"] == pytest.approx(20.0)


def test_object_behind_camera_not_detected():
    det = _detect_pdf([dict(oid=1, otype="car", x=-20, y=0)])
    assert len(det) == 0


def test_object_out_of_range_not_detected():
    det = _detect_pdf([dict(oid=1, otype="car", x=200, y=0)])
    assert len(det) == 0


def test_object_far_off_axis_not_detected():
    # 20 m east but 40 m north: far outside the field of view.
    det = _detect_pdf([dict(oid=1, otype="car", x=20, y=40)])
    assert len(det) == 0


def test_nearer_object_has_larger_box():
    det = _detect_pdf(
        [dict(oid=1, otype="car", x=10, y=2), dict(oid=2, otype="car", x=40, y=2)]
    )
    assert len(det) == 2
    near = det[det["gt_oid"] == 1].iloc[0]
    far = det[det["gt_oid"] == 2].iloc[0]
    assert (near["x2"] - near["x1"]) > (far["x2"] - far["x1"])


def test_bbox_within_image():
    det = _detect_pdf([dict(oid=1, otype="car", x=6, y=-2)])
    if len(det):
        r = det.iloc[0]
        assert -20 <= r["x1"] <= 1620 and -20 <= r["y1"] <= 920  # jitter margin


def test_traffic_light_bbox_above_ground_objects():
    det = _detect_pdf(
        [dict(oid=1, otype="traffic light", x=20, y=0, z=2.5), dict(oid=2, otype="car", x=20, y=3)]
    )
    tl = det[det["gt_oid"] == 1].iloc[0]
    car = det[det["gt_oid"] == 2].iloc[0]
    assert tl["y2"] < car["y2"]  # light sits higher in the image


def test_detection_probability_deterministic():
    objs = [dict(oid=i, otype="car", x=70, y=(i % 9) - 4) for i in range(40)]
    a = _detect_pdf(objs)
    b = _detect_pdf(objs)
    pd.testing.assert_frame_equal(a, b)
    assert len(a) < 40  # at 70 m some detections are dropped


def test_class_confusion_rare_but_present():
    # Many (object, frame) samples: confusion should be ~4 %.
    frames = make_frames(200)
    gt = make_gt([dict(oid=i, otype="car", x=15, y=(i % 5) - 2) for i in range(5)], 200)
    det = project_detections(joined_frame_objects(frames, gt))
    frac = (det["otype"] != det["gt_otype"]).mean()
    assert 0.005 < frac < 0.10
    assert set(det["otype"]) <= {"car", "truck"}


def test_empty_input():
    out = project_detections(pd.DataFrame(columns=["video_id"]))
    assert len(out) == 0


def test_camera_columns_carried():
    det = _detect_pdf([dict(oid=1, otype="car", x=20, y=0)])
    for c in CAMERA_COLS:
        assert c in det.columns
    assert det.iloc[0]["cam_z"] == 1.6


def test_feature_vectors_unit_norm_and_stable_per_object():
    frames = make_frames(30)
    gt = make_gt([dict(oid=7, otype="car", x=18, y=0)], 30)
    det = project_detections(joined_frame_objects(frames, gt))
    f = det[["f0", "f1", "f2", "f3"]].to_numpy()
    np.testing.assert_allclose(np.linalg.norm(f, axis=1), 1.0, atol=1e-9)
    # Same object across frames: features correlate strongly.
    sims = f @ f[0]
    assert sims.mean() > 0.7


def test_detect_spark(spark):
    frames = make_frames(10)
    gt = make_gt(
        [dict(oid=1, otype="car", x=20, y=0), dict(oid=2, otype="person", x=12, y=3)], 10
    )
    out = detect(spark.createDataFrame(frames), spark.createDataFrame(gt)).toPandas()
    assert set(out["gt_oid"]) == {1, 2}
    assert len(out) == 20
    assert [f.name for f in DET_SCHEMA.fields] == list(out.columns)
