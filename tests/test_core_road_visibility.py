"""Tests for §6.1 Road Visibility Pruner."""
import numpy as np
import pandas as pd
import pytest

from repro.core.road_visibility import (
    frame_view_hulls,
    hulls_pandas,
    prune_frames,
    visible_construct_types,
)
from repro.geo.polygon import point_in_polygon
from repro.video.decoder import decode
from repro.world.datasets import ROAD_SCHEMA
from repro.world.roadnetwork import grid_road_network
from tests.helpers import make_frames


@pytest.fixture(scope="module")
def road():
    return grid_road_network(3, 3, spacing=70.0)


def road_sdf(spark, road):
    return spark.createDataFrame(road.df.to_dict("records"), schema=ROAD_SCHEMA)


def test_hulls_pandas_geometry():
    # Camera at (10, -1.75) heading east: hull extends ~50 m east.
    frames = make_frames(1, pos=(10.0, -1.75), heading=0.0)
    h = hulls_pandas(frames, 50.0)
    assert len(h) == 1
    hull = np.array(h.loc[0, "hull"])
    assert len(hull) >= 3
    assert h.loc[0, "hxmin"] == pytest.approx(10.0, abs=1e-6)  # apex
    assert h.loc[0, "hxmax"] == pytest.approx(60.0, abs=1e-6)  # 50 m ahead
    # A point 30 m ahead on the road is inside the viewable area.
    assert point_in_polygon(40.0, -1.75, hull)
    # A point behind the camera is not.
    assert not point_in_polygon(5.0, -1.75, hull)


def test_hull_respects_distance():
    frames = make_frames(1, pos=(0.0, 0.0), heading=90.0)
    h10 = hulls_pandas(frames, 10.0)
    h50 = hulls_pandas(frames, 50.0)
    assert h10.loc[0, "hymax"] == pytest.approx(10.0, abs=1e-6)
    assert h50.loc[0, "hymax"] == pytest.approx(50.0, abs=1e-6)


def test_frame_view_hulls_spark(spark):
    frames = spark.createDataFrame(make_frames(5, pos=(10.0, -1.75)))
    hulls = frame_view_hulls(decode(frames), 50.0).toPandas()
    assert len(hulls) == 5
    assert set(hulls.columns) == {"video_id", "frame_idx", "hull", "hxmin", "hymin", "hxmax", "hymax"}


def test_visible_types_camera_facing_intersection(spark, road):
    # From (30, -1.75) heading east, the intersection at (70, 0) is ~36 m
    # ahead: visible. Lanes are visible too.
    frames = spark.createDataFrame(make_frames(2, pos=(30.0, -1.75), heading=0.0))
    vis = visible_construct_types(
        decode(frames), road_sdf(spark, road), {"intersection", "lane"}, 50.0
    ).toPandas()
    types = set(vis["type"])
    assert types == {"intersection", "lane"}
    assert vis.groupby("frame_idx")["type"].nunique().min() == 2


def test_no_intersection_when_looking_away(spark, road):
    # From block middle heading north (perpendicular to the road), only
    # the narrow cone ahead is visible: no intersection within 50 m.
    frames = spark.createDataFrame(make_frames(1, pos=(35.0, -1.75), heading=90.0))
    vis = visible_construct_types(
        decode(frames), road_sdf(spark, road), {"intersection"}, 50.0
    ).toPandas()
    assert len(vis) == 0


def test_prune_frames_keeps_and_drops(spark, road):
    # Two cameras: one seeing an intersection, one not.
    f_yes = make_frames(3, pos=(30.0, -1.75), heading=0.0, video_id="yes")
    f_no = make_frames(3, pos=(35.0, -1.75), heading=90.0, video_id="no")
    frames = spark.createDataFrame(pd.concat([f_yes, f_no], ignore_index=True))
    kept = prune_frames(decode(frames), road_sdf(spark, road), {"intersection"}, 50.0).toPandas()
    assert set(kept["video_id"]) == {"yes"}
    assert len(kept) == 3


def test_prune_frames_requires_all_types(spark, road):
    # bikeLane exists only on some roads; a camera on a road without one
    # fails the {intersection, bikeLane} conjunction. Row j=1 (y=70) has
    # no bike lane; heading west from x=40 sees the (0,70) intersection
    # but no bike lane (the nearest ones are at y=0/140 and x=70 behind).
    frames = spark.createDataFrame(make_frames(2, pos=(40.0, 70 + 1.75), heading=180.0))
    only_int = prune_frames(
        decode(frames), road_sdf(spark, road), {"intersection"}, 50.0
    ).count()
    both = prune_frames(
        decode(frames), road_sdf(spark, road), {"intersection", "bikeLane"}, 50.0
    ).count()
    assert only_int == 2
    assert both == 0


def test_prune_frames_empty_types_is_noop(spark, road):
    frames = decode(spark.createDataFrame(make_frames(4)))
    assert prune_frames(frames, road_sdf(spark, road), set(), 50.0) is frames


def test_prune_distance_matters(spark, road):
    # Intersection 36 m ahead: visible at d=50, not at d=10.
    frames = spark.createDataFrame(make_frames(1, pos=(30.0, -1.75), heading=0.0))
    road_s = road_sdf(spark, road)
    assert prune_frames(decode(frames), road_s, {"intersection"}, 50.0).count() == 1
    assert prune_frames(decode(frames), road_s, {"intersection"}, 10.0).count() == 0
