"""Unit tests for the ground-truth agent simulator."""
import numpy as np
import pandas as pd
import pytest

from repro.geo.polygon import point_in_polygon
from repro.geo.quaternion import heading_diff_deg
from repro.world.agents import DIMS, SPEED_LIMIT_MPS, simulate_car_path, simulate_objects
from repro.world.roadnetwork import grid_road_network

FPS = 12.0
N = 120


@pytest.fixture(scope="module")
def road():
    return grid_road_network(3, 3, spacing=60.0)


@pytest.fixture(scope="module")
def car_path(road):
    return simulate_car_path(road, np.random.default_rng(0), N, FPS)


def test_car_path_shape(car_path):
    assert list(car_path.columns) == ["frame_idx", "x", "y", "z", "heading", "speed"]
    assert len(car_path) == N
    assert (car_path["z"] == 0).all()


def test_car_path_respects_speed(car_path):
    d = np.hypot(np.diff(car_path["x"]), np.diff(car_path["y"]))
    # Each step moves at most speed*dt (and exactly that, up to corner cuts).
    assert d.max() <= SPEED_LIMIT_MPS / FPS + 1e-9
    assert d.mean() > 0.5 * SPEED_LIMIT_MPS / FPS


def test_car_stays_on_road(road, car_path):
    drivable = [np.array(p) for p in
                road.df[road.df["type"].isin(["lane", "intersection"])]["poly"]]
    for _, r in car_path.iterrows():
        assert any(point_in_polygon(r["x"], r["y"], p) for p in drivable), (
            f"car off road at frame {r['frame_idx']}: ({r['x']:.2f},{r['y']:.2f})"
        )


def test_car_heading_matches_motion(car_path):
    dx = np.diff(car_path["x"])
    dy = np.diff(car_path["y"])
    moving = np.hypot(dx, dy) > 1e-6
    motion_heading = np.rad2deg(np.arctan2(dy, dx))[moving]
    stated = car_path["heading"].to_numpy()[:-1][moving]
    # Heading may lag one frame at transitions; most frames must agree.
    agree = heading_diff_deg(motion_heading, stated) < 1.0
    assert agree.mean() > 0.9


def test_car_path_deterministic(road):
    a = simulate_car_path(road, np.random.default_rng(5), 60, FPS)
    b = simulate_car_path(road, np.random.default_rng(5), 60, FPS)
    pd.testing.assert_frame_equal(a, b)


def test_car_path_start_lane_and_frac(road):
    lane = road.lanes[0]
    p = simulate_car_path(road, np.random.default_rng(1), 5, FPS, start_lane=lane, start_frac=0.0)
    np.testing.assert_allclose(p.loc[0, ["x", "y"]].to_numpy().astype(float), lane.start)
    assert p.loc[0, "heading"] == lane.heading


@pytest.fixture(scope="module")
def objects(road):
    return simulate_objects(
        road, n_frames=N, fps=FPS, seed=3, n_cars=4, n_trucks=1, n_persons=3,
        n_lights=2, n_stopped_bike=2,
    )


def test_objects_schema(objects):
    assert list(objects.columns) == [
        "oid", "otype", "frame_idx", "ts", "x", "y", "z", "heading", "speed",
        "dim_l", "dim_w", "dim_h",
    ]


def test_objects_counts(objects):
    by_type = objects.groupby("otype")["oid"].nunique().to_dict()
    assert by_type["car"] == 4 + 2  # 4 driving + 2 stopped in bike lanes
    assert by_type["truck"] == 1
    assert by_type["person"] == 3
    assert by_type["traffic light"] == 2


def test_every_object_every_frame(objects):
    per = objects.groupby("oid")["frame_idx"].agg(["count", "min", "max"])
    assert (per["count"] == N).all()
    assert (per["min"] == 0).all() and (per["max"] == N - 1).all()


def test_timestamps(objects):
    assert np.allclose(objects["ts"], objects["frame_idx"] / FPS)


def test_dims_match_type(objects):
    for otype, (l, w, h) in DIMS.items():
        sub = objects[objects["otype"] == otype]
        if len(sub):
            assert (sub["dim_l"] == l).all() and (sub["dim_w"] == w).all()


def test_traffic_lights_static_and_elevated(objects):
    tl = objects[objects["otype"] == "traffic light"]
    assert (tl["z"] == 2.5).all()
    assert (tl.groupby("oid")[["x", "y"]].nunique() == 1).all().all()
    assert (tl["speed"] == 0).all()


def test_ground_objects_z_is_half_height(objects):
    cars = objects[(objects["otype"] == "car")]
    assert np.allclose(cars["z"], DIMS["car"][2] / 2)


def test_stopped_cars_in_bike_lane(road, objects):
    stopped = objects[(objects["otype"] == "car") & (objects["speed"] == 0)]
    assert stopped["oid"].nunique() == 2
    bikes = road.df[road.df["type"] == "bikeLane"]
    for _, r in stopped.drop_duplicates("oid").iterrows():
        assert any(point_in_polygon(r["x"], r["y"], np.array(p)) for p in bikes["poly"])


def test_persons_move_slowly(objects):
    p = objects[objects["otype"] == "person"]
    for _, g in p.groupby("oid"):
        d = np.hypot(np.diff(g["x"]), np.diff(g["y"]))
        assert d.max() < 2.0 / FPS + 1e-6


def test_oid_offset():
    road = grid_road_network(2, 2)
    o = simulate_objects(road, n_frames=3, fps=12, seed=0, n_cars=1, n_trucks=0,
                         n_persons=0, n_lights=0, oid_offset=500)
    assert o["oid"].min() == 500
