"""Ground-truth Movable Object simulator.

Replaces nuScenes' annotated real-world objects with synthetic agents
that exhibit the paper's "inherited physical behaviors" (§4.1.1): cars
follow lane directions at roughly the speed limit and turn at
intersections; pedestrians wander near intersections; traffic lights are
static and *not* on the ground (the §6.3 fallback case).

The output is the ground-truth state table the synthetic detector
projects through the camera model — the substitute for "what YOLO would
see" in real footage.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.geo.quaternion import heading_diff_deg
from repro.world.roadnetwork import Lane, RoadNetwork

__all__ = [
    "SPEED_LIMIT_MPS",
    "DIMS",
    "simulate_car_path",
    "simulate_objects",
]

SPEED_LIMIT_MPS = 11.176  # 25 mph, the §6.4.2 assumed speed

# Object dimensions (length, width, height) per type. "traffic light" has
# its center above ground (z > 0) — the geometry estimator cannot assume
# it touches the ground.
DIMS = {
    "car": (4.5, 1.8, 1.5),
    "truck": (8.0, 2.5, 3.2),
    "person": (0.6, 0.6, 1.7),
    "bicycle": (1.8, 0.6, 1.4),
    "traffic light": (0.4, 0.4, 1.0),
}


def _pick_next_lane(road: RoadNetwork, lane: Lane, rng: np.random.Generator) -> Lane:
    """Choose the outgoing lane at ``lane.into_node``: straight preferred,
    then left/right turns; U-turns only if nothing else exists."""
    node = lane.into_node
    assert node is not None
    out = road.lanes_out_of(node)
    if not out:  # should not happen on a >=2x2 grid
        return lane
    def diff(l2: Lane) -> float:
        return float(heading_diff_deg(lane.heading, l2.heading))

    non_uturn = [l for l in out if diff(l) < 179.0]
    candidates = non_uturn or out
    weights = np.array([3.0 if diff(l) < 1.0 else 1.0 for l in candidates])
    return candidates[rng.choice(len(candidates), p=weights / weights.sum())]


def simulate_car_path(
    road: RoadNetwork,
    rng: np.random.Generator,
    n_frames: int,
    fps: float,
    start_lane: Lane | None = None,
    start_frac: float | None = None,
    speed: float = SPEED_LIMIT_MPS,
    lateral_offset: float = 0.0,
) -> pd.DataFrame:
    """Drive one car along the lane graph for ``n_frames`` steps.

    The car moves along lane centerlines at ``speed``; inside an
    intersection it interpolates linearly between the old lane's end and
    the next lane's start while its heading turns toward the new lane.
    ``lateral_offset`` > 0 shifts the car perpendicular-left of its
    heading — a wrong-way driver sitting in the opposing lane polygon
    (the Scenic-style oncoming-traffic scenario behind Q3).
    Returns a DataFrame with columns frame_idx, x, y, z, heading, speed.
    """
    dt = 1.0 / fps
    lane = start_lane or road.lanes[rng.integers(len(road.lanes))]
    frac = rng.uniform(0.0, 0.7) if start_frac is None else start_frac
    lane_vec = lane.end - lane.start
    lane_len = float(np.hypot(*lane_vec))
    pos = lane.start + lane_vec * frac
    dist_left = lane_len * (1.0 - frac)
    heading = lane.heading
    mode = "lane"
    target_lane: Lane | None = None
    rows = []
    for f in range(n_frames):
        h_rad = np.deg2rad(heading)
        ox = pos[0] - np.sin(h_rad) * lateral_offset
        oy = pos[1] + np.cos(h_rad) * lateral_offset
        rows.append((f, ox, oy, 0.0, heading % 360.0, speed))
        step = speed * dt
        if mode == "lane":
            if step < dist_left:
                pos = pos + step * lane_vec / lane_len
                dist_left -= step
            else:
                # Reached lane end: enter the intersection toward next lane.
                pos = lane.end.copy()
                target_lane = _pick_next_lane(road, lane, rng)
                mode = "xing"
        else:
            assert target_lane is not None
            to_start = target_lane.start - pos
            gap = float(np.hypot(*to_start))
            if step < gap:
                pos = pos + step * to_start / gap
                heading = float(np.rad2deg(np.arctan2(to_start[1], to_start[0])))
            else:
                lane = target_lane
                lane_vec = lane.end - lane.start
                lane_len = float(np.hypot(*lane_vec))
                pos = lane.start.copy()
                dist_left = lane_len
                heading = lane.heading
                mode = "lane"
    return pd.DataFrame(rows, columns=["frame_idx", "x", "y", "z", "heading", "speed"])


def _simulate_pedestrian(
    road: RoadNetwork,
    rng: np.random.Generator,
    n_frames: int,
    fps: float,
    node: np.ndarray | None = None,
) -> pd.DataFrame:
    """Random-waypoint walk within ~15 m of an intersection."""
    if node is None:
        node = list(road.nodes.values())[rng.integers(len(road.nodes))]
    dt = 1.0 / fps
    speed = rng.uniform(1.0, 1.6)
    pos = node + rng.uniform(-6, 6, size=2)
    wp = node + rng.uniform(-15, 15, size=2)
    heading = 0.0
    rows = []
    for f in range(n_frames):
        to_wp = wp - pos
        gap = float(np.hypot(*to_wp))
        if gap < 0.5:
            wp = node + rng.uniform(-15, 15, size=2)
            to_wp = wp - pos
            gap = float(np.hypot(*to_wp))
        heading = float(np.rad2deg(np.arctan2(to_wp[1], to_wp[0]))) % 360.0
        rows.append((f, pos[0], pos[1], 0.0, heading, speed))
        pos = pos + min(speed * dt, gap) * to_wp / gap
    return pd.DataFrame(rows, columns=["frame_idx", "x", "y", "z", "heading", "speed"])


def _static_object(
    x: float, y: float, z: float, heading: float, n_frames: int
) -> pd.DataFrame:
    return pd.DataFrame(
        {
            "frame_idx": np.arange(n_frames),
            "x": x,
            "y": y,
            "z": z,
            "heading": heading,
            "speed": 0.0,
        }
    )


def simulate_objects(
    road: RoadNetwork,
    *,
    n_frames: int,
    fps: float,
    seed: int,
    n_cars: int = 8,
    n_trucks: int = 2,
    n_persons: int = 5,
    n_lights: int = 4,
    n_stopped_bike: int = 0,
    oid_offset: int = 0,
    car_starts: list[tuple[Lane, float]] | None = None,
    ped_nodes: list[np.ndarray] | None = None,
) -> pd.DataFrame:
    """Simulate all ground-truth Movable Objects of one scene.

    ``n_stopped_bike`` parks that many cars inside bike lanes (speed 0) —
    the Q10/SkyQuery scenario. ``car_starts`` pins the first cars to
    given (lane, fraction) positions (scenes use this to seed traffic
    near the ego route); ``ped_nodes`` pins pedestrians to given
    intersections. Returns one row per (oid, frame):
    oid, otype, frame_idx, ts, x, y, z, heading, speed, dim_l/w/h.
    """
    rng = np.random.default_rng(seed)
    parts: list[pd.DataFrame] = []
    oid = oid_offset

    def emit(track: pd.DataFrame, otype: str, z_center: float | None = None):
        nonlocal oid
        t = track.copy()
        l, w, h = DIMS[otype]
        t["oid"] = oid
        t["otype"] = otype
        t["z"] = h / 2 if z_center is None else z_center  # object center height
        t["dim_l"], t["dim_w"], t["dim_h"] = l, w, h
        t["ts"] = t["frame_idx"] / fps
        parts.append(t)
        oid += 1

    pinned = list(car_starts or [])
    for c in range(n_cars):
        if c < len(pinned):
            lane, frac = pinned[c]
            track = simulate_car_path(
                road, rng, n_frames, fps,
                start_lane=lane, start_frac=frac, speed=rng.uniform(9.5, 12.0),
            )
        else:
            track = simulate_car_path(road, rng, n_frames, fps, speed=rng.uniform(8.0, 13.0))
        emit(track, "car")
    for _ in range(n_trucks):
        emit(simulate_car_path(road, rng, n_frames, fps, speed=rng.uniform(7.0, 11.0)), "truck")
    nodes = list(ped_nodes or [])
    for p in range(n_persons):
        node = nodes[p % len(nodes)] if nodes else None
        emit(_simulate_pedestrian(road, rng, n_frames, fps, node=node), "person")
    # Traffic lights at intersection corners, 2.5 m above ground —
    # preferring the scene's route intersections when given.
    node_list = nodes or list(road.nodes.values())
    for li in range(n_lights):
        node = (
            node_list[li % len(nodes)] if nodes
            else node_list[rng.integers(len(node_list))]
        )
        corner = node + rng.choice([-1, 1], size=2) * (road.half_int + 0.5)
        emit(_static_object(corner[0], corner[1], 0, 0.0, n_frames), "traffic light", z_center=2.5)
    # Stopped cars in bike lanes.
    bikes = road.df[road.df["type"] == "bikeLane"]
    for b in range(n_stopped_bike):
        if bikes.empty:
            break
        row = bikes.iloc[rng.integers(len(bikes))]
        if row["xmax"] - row["xmin"] >= row["ymax"] - row["ymin"]:  # east-west bike lane
            x = rng.uniform(row["xmin"] + 3, row["xmax"] - 3)
            y = (row["ymin"] + row["ymax"]) / 2
        else:  # north-south bike lane
            x = (row["xmin"] + row["xmax"]) / 2
            y = rng.uniform(row["ymin"] + 3, row["ymax"] - 3)
        emit(_static_object(x, y, 0, float(row["heading"]), n_frames), "car")

    out = pd.concat(parts, ignore_index=True)
    return out[
        ["oid", "otype", "frame_idx", "ts", "x", "y", "z", "heading", "speed", "dim_l", "dim_w", "dim_h"]
    ]
