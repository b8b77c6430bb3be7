"""Tests for the Movable Objects Query Engine (§5.2.3).

Result-equality tests run the compiled Spark query against hand-written
DuckDB SQL via the oracle. Our road polygons are axis-aligned
rectangles, so DuckDB can express ``contains`` as BETWEEN while Spark
runs the general point-in-polygon path — if they agree, the spatial join
machinery is right.
"""
import numpy as np
import pandas as pd
import pytest

from repro.core import predicates as P
from repro.core.query_engine import compile_filter, movable_objects
from repro.oracle import assert_equivalent
from repro.world.datasets import ROAD_SCHEMA
from repro.world.roadnetwork import grid_road_network
from tests.helpers import make_frames

FPS = 12.0


@pytest.fixture(scope="module")
def road():
    return grid_road_network(3, 3, spacing=70.0)


@pytest.fixture(scope="module")
def objects_pdf(road):
    """A synthetic Movable Objects table with varied placements."""
    rng = np.random.default_rng(42)
    rows = []
    for vid in ("v0", "v1"):
        for oid in range(10):
            otype = ["car", "person", "truck"][oid % 3]
            x0, y0 = rng.uniform(-8, 78, 2)
            hd = rng.uniform(0, 360)
            for f in range(10):
                rows.append(
                    {
                        "video_id": vid,
                        "frame_idx": f,
                        "ts": f / FPS,
                        "oid": oid,
                        "otype": otype,
                        "x": x0 + 0.5 * f,
                        "y": y0 + 0.2 * f,
                        "z": 0.0,
                        "heading": (hd + f) % 360.0,
                        "speed": rng.uniform(0, 12),
                        "turn_left": bool(oid % 4 == 1),
                        "stopped": bool(oid % 5 == 2),
                    }
                )
    return pd.DataFrame(rows)


@pytest.fixture(scope="module")
def cams_pdf():
    a = make_frames(10, pos=(10.0, -1.75), heading=0.0, video_id="v0")
    b = make_frames(10, pos=(35.0, 68.25), heading=90.0, video_id="v1")
    return pd.concat([a, b], ignore_index=True)


@pytest.fixture(scope="module")
def engine_tables(spark, road, objects_pdf, cams_pdf):
    return (
        spark.createDataFrame(objects_pdf),
        spark.createDataFrame(cams_pdf),
        spark.createDataFrame(road.df.to_dict("records"), schema=ROAD_SCHEMA),
    )


def _duck_road(road):
    return road.df.drop(columns=["poly"])


DIST = "sqrt(power(c.cam_x - {o}.x, 2) + power(c.cam_y - {o}.y, 2)) < 50"


def test_single_object_contains_oracle(engine_tables, road, objects_pdf, cams_pdf):
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.contains(P.geo_construct("intersection"), P.obj(0)),
            P.distance_lt(P.camera(), P.obj(0), 50.0),
        )
    )
    got = compile_filter(objects, cams, road_sdf, pred).select(
        "video_id", "frame_idx", "oid_0"
    )
    sql = f"""
        SELECT DISTINCT o.video_id AS video_id, o.frame_idx AS frame_idx, o.oid AS oid_0
        FROM objects o
        JOIN cams c ON c.video_id = o.video_id AND c.frame_idx = o.frame_idx
        JOIN road g ON g.type = 'intersection'
         AND o.x BETWEEN g.xmin AND g.xmax AND o.y BETWEEN g.ymin AND g.ymax
        WHERE o.otype = 'car' AND {DIST.format(o='o')}
    """
    assert_equivalent(got, sql, objects=objects_pdf, cams=cams_pdf, road=_duck_road(road))


def test_two_object_self_join_oracle(engine_tables, road, objects_pdf, cams_pdf):
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.type_in(P.obj(1), "car"),
            P.contains(P.geo_construct("lanegroup"), [P.obj(0), P.obj(1)]),
            P.distance_lt(P.camera(), P.obj(0), 50.0),
            P.distance_lt(P.camera(), P.obj(1), 50.0),
        )
    )
    got = compile_filter(objects, cams, road_sdf, pred).select(
        "video_id", "frame_idx", "oid_0", "oid_1"
    )
    sql = f"""
        SELECT DISTINCT o1.video_id AS video_id, o1.frame_idx AS frame_idx,
               o1.oid AS oid_0, o2.oid AS oid_1
        FROM objects o1
        JOIN objects o2 ON o1.video_id = o2.video_id
         AND o1.frame_idx = o2.frame_idx AND o1.oid < o2.oid
        JOIN cams c ON c.video_id = o1.video_id AND c.frame_idx = o1.frame_idx
        JOIN road g ON g.type = 'lanegroup'
         AND o1.x BETWEEN g.xmin AND g.xmax AND o1.y BETWEEN g.ymin AND g.ymax
         AND o2.x BETWEEN g.xmin AND g.xmax AND o2.y BETWEEN g.ymin AND g.ymax
        WHERE o1.otype = 'car' AND o2.otype = 'car'
         AND {DIST.format(o='o1')} AND {DIST.format(o='o2')}
    """
    assert_equivalent(got, sql, objects=objects_pdf, cams=cams_pdf, road=_duck_road(road))


def test_heading_diff_oracle(engine_tables, road, objects_pdf, cams_pdf):
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car", "truck"),
            P.perpendicular(P.obj(0), P.camera()),
        )
    )
    got = compile_filter(objects, cams, road_sdf, pred).select(
        "video_id", "frame_idx", "oid_0"
    )
    sql = """
        SELECT DISTINCT o.video_id AS video_id, o.frame_idx AS frame_idx, o.oid AS oid_0
        FROM objects o
        JOIN cams c ON c.video_id = o.video_id AND c.frame_idx = o.frame_idx
        WHERE o.otype IN ('car', 'truck')
          AND least(abs(o.heading - c.cam_heading), 360 - abs(o.heading - c.cam_heading))
              BETWEEN 70 AND 110
    """
    assert_equivalent(got, sql, objects=objects_pdf, cams=cams_pdf, road=_duck_road(road))


def test_lane_heading_predicates_oracle(engine_tables, road, objects_pdf, cams_pdf):
    # Q3-style: contains(lane, [camera, car]) & opposite(lane, camera)
    # & same_direction(lane, car) & distance < 10.
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.contains(P.geo_construct("lane"), [P.camera(), P.obj(0)]),
            P.opposite(P.geo_construct("lane"), P.camera()),
            P.same_direction(P.geo_construct("lane"), P.obj(0)),
            P.distance_lt(P.camera(), P.obj(0), 10.0),
        )
    )
    got = compile_filter(objects, cams, road_sdf, pred).select(
        "video_id", "frame_idx", "oid_0"
    )
    sql = """
        SELECT DISTINCT o.video_id AS video_id, o.frame_idx AS frame_idx, o.oid AS oid_0
        FROM objects o
        JOIN cams c ON c.video_id = o.video_id AND c.frame_idx = o.frame_idx
        JOIN road g ON g.type = 'lane'
         AND o.x BETWEEN g.xmin AND g.xmax AND o.y BETWEEN g.ymin AND g.ymax
         AND c.cam_x BETWEEN g.xmin AND g.xmax AND c.cam_y BETWEEN g.ymin AND g.ymax
        WHERE o.otype = 'car'
          AND least(abs(g.heading - c.cam_heading), 360 - abs(g.heading - c.cam_heading))
              BETWEEN 140 AND 180
          AND least(abs(g.heading - o.heading), 360 - abs(g.heading - o.heading))
              BETWEEN 0 AND 40
          AND sqrt(power(c.cam_x - o.x, 2) + power(c.cam_y - o.y, 2)) < 10
    """
    assert_equivalent(got, sql, objects=objects_pdf, cams=cams_pdf, road=_duck_road(road))


def test_turn_left_and_stopped_flags(engine_tables, road, objects_pdf, cams_pdf):
    objects, cams, road_sdf = engine_tables
    pred = P.And((P.type_in(P.obj(0), "car", "truck", "person"), P.turn_left(P.obj(0))))
    got = compile_filter(objects, cams, road_sdf, pred).select(
        "video_id", "frame_idx", "oid_0"
    )
    sql = """
        SELECT DISTINCT video_id, frame_idx, oid AS oid_0 FROM objects
        WHERE turn_left AND otype IN ('car','truck','person')
    """
    assert_equivalent(got, sql, objects=objects_pdf, cams=cams_pdf, road=_duck_road(road))


def test_different_types_use_neq_not_lt(engine_tables, road):
    # car + person pair must NOT dedupe by oid ordering.
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.type_in(P.obj(1), "person"),
            P.distance_lt(P.obj(0), P.obj(1), 30.0),
        )
    )
    got = compile_filter(objects, cams, road_sdf, pred).toPandas()
    if len(got):
        # person oids may be smaller than car oids: pairs survive anyway.
        assert (got["otype_0"] == "car").all()
        assert (got["otype_1"] == "person").all()


def test_empty_result_ok(engine_tables, road):
    objects, cams, road_sdf = engine_tables
    pred = P.And(
        (P.type_in(P.obj(0), "bicycle"), P.contains(P.geo_construct("lane"), P.obj(0)))
    )
    got = compile_filter(objects, cams, road_sdf, pred)
    assert got.count() == 0


# ---------------------------------------------------------------- movable_objects


def _tracked(rows):
    df = pd.DataFrame(
        rows,
        columns=["video_id", "frame_idx", "track_id", "otype", "wx", "wy"],
    )
    df["ts"] = df["frame_idx"] / FPS
    df["wz"] = 0.0
    return df


def test_movable_objects_heading_speed(spark):
    rows = [("v0", f, 0, "car", 10.0 * f / FPS, 0.0) for f in range(12)]
    out = movable_objects(spark.createDataFrame(_tracked(rows)), fps=FPS).toPandas()
    assert len(out) == 12
    assert np.allclose(out["heading"], 0.0)
    assert np.allclose(out["speed"], 10.0)
    assert not out["turn_left"].any()
    assert not out["stopped"].any()


def test_movable_objects_stationary_is_stopped(spark):
    rows = [("v0", f, 3, "car", 5.0, 5.0) for f in range(12)]
    out = movable_objects(spark.createDataFrame(_tracked(rows)), fps=FPS).toPandas()
    assert out["stopped"].all()
    assert out["heading"].isna().all()  # no motion, no heading


def test_movable_objects_turn_left(spark):
    # East for 1 s then north for 2 s: the centered +-1.25 s window sees
    # the +90 deg CCW change around the turn, not long after it.
    rows = []
    for f in range(12):
        rows.append(("v0", f, 7, "car", 8.0 * f / FPS, 0.0))
    x_turn = 8.0 * 11 / FPS
    for f in range(12, 36):
        rows.append(("v0", f, 7, "car", x_turn, 8.0 * (f - 11) / FPS))
    out = movable_objects(spark.createDataFrame(_tracked(rows)), fps=FPS).toPandas()
    during = out[(out["frame_idx"] >= 8) & (out["frame_idx"] <= 14)]
    assert during["turn_left"].all()
    late = out[out["frame_idx"] >= 30]
    assert not late["turn_left"].any()


def test_movable_objects_majority_type(spark):
    rows = [("v0", f, 1, "car" if f != 3 else "truck", float(f), 0.0) for f in range(9)]
    out = movable_objects(spark.createDataFrame(_tracked(rows)), fps=FPS).toPandas()
    assert (out["otype"] == "car").all()


def test_movable_objects_drops_unassigned(spark):
    rows = [("v0", 0, -1, "car", 0.0, 0.0), ("v0", 0, 2, "car", 1.0, 1.0)]
    out = movable_objects(spark.createDataFrame(_tracked(rows)), fps=FPS).toPandas()
    assert len(out) == 1 and out.iloc[0]["oid"] == 2
