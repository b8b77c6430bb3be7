"""Tests for the HOTA AssA and skip-distance F1 metrics."""
import numpy as np
import pandas as pd
import pytest

from repro.metrics.f1 import skip_f1, skip_runtime_ratio
from repro.metrics.hota import assa, frame_matches


def _tracks(rows):
    """rows: (video, frame, tid, cx) -> 10x10 boxes centered at cx."""
    return pd.DataFrame(
        [
            {"video_id": v, "frame_idx": f, "tid": t,
             "x1": cx - 5.0, "y1": 0.0, "x2": cx + 5.0, "y2": 10.0}
            for v, f, t, cx in rows
        ]
    )


def test_perfect_tracking_assa_1():
    gt = _tracks([("v", f, 0, 10.0 * f) for f in range(5)])
    pred = _tracks([("v", f, 99, 10.0 * f) for f in range(5)])  # ids may differ
    assert assa(gt, pred) == pytest.approx(1.0)


def test_identity_switch_halves_assa():
    gt = _tracks([("v", f, 0, 0.0) for f in range(10)])
    # Prediction switches id halfway: each TP sees TPA=5, FNA=5, FPA=0.
    pred = _tracks([("v", f, 1 if f < 5 else 2, 0.0) for f in range(10)])
    assert assa(gt, pred) == pytest.approx(0.5)


def test_two_objects_swapped_ids():
    gt = _tracks(
        [("v", f, 0, 0.0) for f in range(4)] + [("v", f, 1, 100.0) for f in range(4)]
    )
    pred_good = _tracks(
        [("v", f, 7, 0.0) for f in range(4)] + [("v", f, 8, 100.0) for f in range(4)]
    )
    assert assa(gt, pred_good) == pytest.approx(1.0)
    # Swap pred ids between the two objects halfway: every TP now has
    # TPA=2, FNA=2 (frames matched to the other pred) and FPA=2 (the
    # pred's frames on the other object) -> A = 2/6.
    pred_swap = _tracks(
        [("v", f, 7 if f < 2 else 8, 0.0) for f in range(4)]
        + [("v", f, 8 if f < 2 else 7, 100.0) for f in range(4)]
    )
    assert assa(gt, pred_swap) == pytest.approx(1 / 3)


def test_missed_frames_reduce_assa_via_fna():
    gt = _tracks([("v", f, 0, 0.0) for f in range(10)])
    pred = _tracks([("v", f, 1, 0.0) for f in range(5)])  # second half missed
    # TPs: 5; each A(c) = 5 / (5 + 5 + 0) = 0.5.
    assert assa(gt, pred) == pytest.approx(0.5)


def test_no_overlap_zero():
    gt = _tracks([("v", 0, 0, 0.0)])
    pred = _tracks([("v", 0, 1, 500.0)])
    assert assa(gt, pred) == 0.0


def test_empty_inputs():
    empty = _tracks([])
    assert assa(empty, empty) == 1.0
    assert assa(_tracks([("v", 0, 0, 0.0)]), empty) == 0.0


def test_frame_matches_gating():
    gt = _tracks([("v", 0, 0, 0.0)])
    pred_close = _tracks([("v", 0, 1, 2.0)])  # IoU ~0.67
    pred_far = _tracks([("v", 0, 1, 8.0)])  # IoU ~0.11
    assert len(frame_matches(gt, pred_close)) == 1
    assert len(frame_matches(gt, pred_far)) == 0


def test_frame_matches_validates_columns():
    with pytest.raises(ValueError):
        frame_matches(pd.DataFrame({"video_id": []}), _tracks([]))


def test_assa_multi_video_independent():
    gt = _tracks([("a", f, 0, 0.0) for f in range(4)] + [("b", f, 0, 0.0) for f in range(4)])
    pred = _tracks([("a", f, 5, 0.0) for f in range(4)] + [("b", f, 5, 0.0) for f in range(4)])
    assert assa(gt, pred) == pytest.approx(1.0)


# ---------------------------------------------------------------- skip F1


def _efs_out(rows):
    return pd.DataFrame(
        [{"video_id": v, "frame_idx": f, "gt_oid": o, "track_id": t} for v, f, o, t in rows]
    )


def test_skip_f1_perfect():
    rows = [("v", f, 1, 10) for f in (0, 5, 10)]
    out = skip_f1(_efs_out(rows))
    assert list(out["skip"]) == [4]
    assert out.iloc[0]["f1"] == 1.0
    assert out.iloc[0]["tp"] == 2


def test_skip_f1_identity_break():
    rows = [("v", 0, 1, 10), ("v", 9, 1, 11)]  # new id after the gap
    out = skip_f1(_efs_out(rows))
    assert out.iloc[0]["skip"] == 8
    assert out.iloc[0]["fn"] == 1 and out.iloc[0]["tp"] == 0
    assert out.iloc[0]["f1"] == 0.0


def test_skip_f1_identity_theft_counts_fp():
    rows = [
        ("v", 0, 1, 10), ("v", 0, 2, 20),
        ("v", 7, 1, 20), ("v", 7, 2, 10),  # ids swapped across the gap
    ]
    out = skip_f1(_efs_out(rows))
    r = out.iloc[0]
    assert r["fn"] == 2 and r["fp"] == 2 and r["tp"] == 0


def test_skip_f1_object_leaving_not_counted():
    rows = [("v", 0, 1, 10), ("v", 6, 2, 11)]  # different objects entirely
    out = skip_f1(_efs_out(rows))
    assert len(out) == 0 or out["tp"].sum() + out["fn"].sum() == 0


def test_skip_f1_groups_by_skip_distance():
    rows = [("v", 0, 1, 10), ("v", 1, 1, 10), ("v", 10, 1, 10)]
    out = skip_f1(_efs_out(rows))
    assert set(out["skip"]) == {0, 8}


def test_runtime_ratio_decreases_with_skip():
    r = [skip_runtime_ratio(s) for s in range(0, 14)]
    assert all(b < a for a, b in zip(r, r[1:]))
    assert r[0] > 1.0  # skip 0: pure overhead
    # Paper: ~28 % per-frame runtime at skip distance 13.
    assert r[13] == pytest.approx(0.28, abs=0.1)


def test_runtime_ratio_average_skip_near_paper():
    # Paper: with an average skip of 3.6 frames, per-frame runtime ~39 %.
    assert skip_runtime_ratio(4) == pytest.approx(0.39, abs=0.12)
