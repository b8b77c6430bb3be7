"""Tests for the SORT-family tracker."""
import numpy as np
import pandas as pd
import pytest

from repro.video.detector import project_detections
from repro.video.tracker import _iou_matrix, track_objects, track_pandas
from tests.helpers import joined_frame_objects, make_frames, make_gt


def _tracked(objs, n_frames, variant="strongsort", **kw):
    frames = make_frames(n_frames, **kw)
    gt = make_gt(objs, n_frames)
    det = project_detections(joined_frame_objects(frames, gt))
    return track_pandas(det, variant=variant)


def test_iou_matrix_basic():
    a = np.array([[0.0, 0.0, 10.0, 10.0]])
    b = np.array([[0.0, 0.0, 10.0, 10.0], [5.0, 5.0, 15.0, 15.0], [20.0, 20.0, 30.0, 30.0]])
    m = _iou_matrix(a, b)
    np.testing.assert_allclose(m[0], [1.0, 25 / 175, 0.0])


def test_iou_matrix_empty():
    assert _iou_matrix(np.zeros((0, 4)), np.zeros((3, 4))).shape == (0, 3)


def test_single_object_single_track():
    # A car driving ahead of a static camera: one stable track id.
    out = _tracked([dict(oid=1, otype="car", x=15, fx=lambda f: 15 + 0.6 * f, y=0)], 30)
    assert out["track_id"].nunique() == 1
    assert (out["track_id"] >= 0).all()


def test_two_objects_two_tracks():
    out = _tracked(
        [
            dict(oid=1, otype="car", x=0, fx=lambda f: 15 + 0.5 * f, y=-2),
            dict(oid=2, otype="car", x=0, fx=lambda f: 30 - 0.5 * f, y=2),
        ],
        30,
    )
    assert out["track_id"].nunique() == 2
    # Each gt object maps to exactly one track id (no switches).
    purity = out.groupby("gt_oid")["track_id"].nunique()
    assert (purity == 1).all()


def test_object_leaving_and_entering_gets_new_track():
    # Object 1 exists frames 0-9; object 2 (far away position) frames 20-29.
    frames = make_frames(30)
    gt1 = make_gt([dict(oid=1, otype="car", x=20, y=-2)], 10)
    gt2 = make_gt([dict(oid=2, otype="car", x=40, y=3)], 30)
    gt2 = gt2[gt2["frame_idx"] >= 20]
    det = project_detections(joined_frame_objects(frames, pd.concat([gt1, gt2])))
    out = track_pandas(det)
    t1 = set(out[out["gt_oid"] == 1]["track_id"])
    t2 = set(out[out["gt_oid"] == 2]["track_id"])
    assert t1 and t2 and not (t1 & t2)


def test_tracking_with_frame_gaps_keeps_identity():
    # Detections only on every 4th frame (an EFS-like sampling); the
    # velocity model must still bridge the gaps for slow motion.
    frames = make_frames(40)
    gt = make_gt([dict(oid=1, otype="car", x=15, fx=lambda f: 15 + 0.3 * f, y=0)], 40)
    det = project_detections(joined_frame_objects(frames, gt))
    det = det[det["frame_idx"] % 4 == 0]
    out = track_pandas(det)
    assert out["track_id"].nunique() == 1


def test_huge_gap_breaks_identity_for_sort():
    # SORT (IoU-only) loses a fast object across a 20-frame gap.
    frames = make_frames(42)
    gt = make_gt([dict(oid=1, otype="car", x=0, fx=lambda f: 10 + 1.2 * f, y=0)], 42)
    det = project_detections(joined_frame_objects(frames, gt))
    det = det[(det["frame_idx"] <= 2) | (det["frame_idx"] >= 40)]
    out = track_pandas(det, variant="sort")
    assert out["track_id"].nunique() >= 2


def test_crossing_objects_appearance_helps():
    # Two objects crossing paths: strongsort keeps purity via features.
    out = _tracked(
        [
            dict(oid=1, otype="car", x=0, fx=lambda f: 12 + 0.8 * f, y=-3),
            dict(oid=2, otype="car", x=0, fx=lambda f: 36 - 0.8 * f, y=3),
        ],
        30,
        variant="strongsort",
    )
    purity = out.groupby("gt_oid")["track_id"].nunique()
    assert purity.max() <= 2  # at most one switch


def test_deterministic():
    objs = [dict(oid=i, otype="car", x=10 + 5 * i, y=(i % 3) - 1) for i in range(4)]
    a = _tracked(objs, 20)
    b = _tracked(objs, 20)
    pd.testing.assert_frame_equal(a, b)


def test_track_objects_spark(spark):
    frames = make_frames(20)
    gt = make_gt(
        [
            dict(oid=1, otype="car", x=15, fx=lambda f: 15 + 0.5 * f, y=-2),
            dict(oid=2, otype="person", x=10, y=3),
        ],
        20,
    )
    det = project_detections(joined_frame_objects(frames, gt))
    out = track_objects(spark.createDataFrame(det)).toPandas()
    assert "track_id" in out.columns
    assert out[out["gt_oid"] == 1]["track_id"].nunique() == 1
    assert out[out["gt_oid"] == 2]["track_id"].nunique() == 1
