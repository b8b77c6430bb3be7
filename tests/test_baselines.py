"""Tests for the five §7.1 comparison-system simulations."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.eva import EvaSession
from repro.baselines.nuscenes_devkit import MaterializationLimit, run_devkit_query
from repro.baselines.otif import OTIF_TRAINING_MS, run_otif
from repro.baselines.skyquery import run_skyquery, run_spatialyze_with_skyquery_models
from repro.baselines.viva import PLAN_SEARCH_MS, resample_fps, run_viva
from repro.core import predicates as P
from repro.core.queries import query
from repro.world.datasets import ROAD_SCHEMA, nuscenes_lite, skyquery_lite
from repro.world.roadnetwork import grid_road_network


@pytest.fixture(scope="module")
def tiny_ds():
    return nuscenes_lite(1, seed=0, n_frames=36)


@pytest.fixture(scope="module")
def tiny_sdfs(spark, tiny_ds):
    return (
        spark.createDataFrame(tiny_ds.cameras),
        spark.createDataFrame(tiny_ds.gt),
        spark.createDataFrame(tiny_ds.road.df.to_dict("records"), schema=ROAD_SCHEMA),
    )


# ---------------------------------------------------------------- EVA


def test_eva_cache_amortizes_models(tiny_sdfs):
    cams, gt, road = tiny_sdfs
    eva = EvaSession(cams, gt, road)
    _, cost5 = eva.run_query(query("Q5"))
    _, cost6 = eva.run_query(query("Q6"))
    # First query pays detector+depth; the second runs from the cache.
    assert cost5.ms("yolo") > 0 and cost5.ms("depth") > 0
    assert cost6.ms("yolo") == 0 and cost6.ms("depth") == 0
    assert cost6.ms("eva_udf") > 0
    assert cost6.total_ms < cost5.total_ms


def test_eva_always_runs_depth_on_every_frame(tiny_sdfs, tiny_ds):
    cams, gt, road = tiny_sdfs
    eva = EvaSession(cams, gt, road)
    _, cost = eva.run_query(query("Q5"))
    # No road pruning: the detector cost covers ALL frames.
    assert cost.count("yolo") == tiny_ds.n_frames


def test_eva_q8_count_semantics(tiny_sdfs):
    cams, gt, road = tiny_sdfs
    eva = EvaSession(cams, gt, road)
    res, _ = eva.run_query(query("Q8"), min_count=3)
    pdf = res.toPandas()
    assert set(pdf.columns) == {"video_id", "frame_idx"}
    res1, _ = eva.run_query(query("Q8"), min_count=1)
    assert len(res1.toPandas()) >= len(pdf)


# ---------------------------------------------------------------- VIVA


def test_resample_fps_keeps_every_kth(spark, tiny_ds):
    cams = spark.createDataFrame(tiny_ds.cameras)
    out = resample_fps(cams, 12.0, 1.0).toPandas()
    assert sorted(out["frame_idx"].unique()) == list(range(0, 36, 12))


def test_viva_cost_structure(tiny_sdfs, tiny_ds):
    cams, gt, road = tiny_sdfs
    res, cost = run_viva(cams, gt, road, query("Q9"), fps=tiny_ds.fps)
    assert cost.ms("viva_plan_search") == PLAN_SEARCH_MS
    assert cost.ms("viva_proxy") > 0
    assert cost.count("viva_proxy") == tiny_ds.n_frames
    # Tracker processed all object types (no OTP): more tracked dets
    # than a car-only pipeline would see.
    assert cost.count("track") > 0
    res.count()  # result computes without error


# ---------------------------------------------------------------- devkit


@pytest.fixture(scope="module")
def devkit_tables():
    road = grid_road_network(3, 3, spacing=70.0)
    rng = np.random.default_rng(3)
    rows = []
    for oid in range(8):
        for f in range(6):
            rows.append(
                {
                    "video_id": "v0", "frame_idx": f, "ts": f / 12.0, "oid": oid,
                    "otype": ["car", "person"][oid % 2],
                    "x": float(rng.uniform(60, 80)), "y": float(rng.uniform(-5, 5)),
                    "z": 0.0, "heading": float(rng.uniform(0, 360)),
                    "speed": 5.0, "turn_left": False, "stopped": False,
                }
            )
    objects = pd.DataFrame(rows)
    cams = pd.DataFrame(
        [{"video_id": "v0", "frame_idx": f, "ts": f / 12.0, "cam_x": 35.0,
          "cam_y": -1.75, "cam_heading": 0.0} for f in range(6)]
    )
    return road, objects, cams


def test_devkit_matches_engine_semantics(spark, devkit_tables):
    from repro.core.query_engine import compile_filter

    road, objects, cams = devkit_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.type_in(P.obj(1), "car"),
            P.contains(P.geo_construct("intersection"), [P.obj(0), P.obj(1)]),
            P.distance_lt(P.camera(), P.obj(0), 50.0),
            P.distance_lt(P.camera(), P.obj(1), 50.0),
        )
    )
    naive = run_devkit_query(objects, cams, road.df, pred)
    # Full camera columns for the Spark engine.
    from tests.helpers import make_frames

    cams_full = make_frames(6, pos=(35.0, -1.75), heading=0.0)
    engine = (
        compile_filter(
            spark.createDataFrame(objects),
            spark.createDataFrame(cams_full),
            spark.createDataFrame(road.df.to_dict("records"), schema=ROAD_SCHEMA),
            pred,
        )
        .select("video_id", "frame_idx", "oid_0", "oid_1")
        .toPandas()
    )
    key = ["video_id", "frame_idx", "oid_0", "oid_1"]
    a = naive.sort_values(key).reset_index(drop=True)
    b = engine[key].sort_values(key).reset_index(drop=True)
    pd.testing.assert_frame_equal(a, b.astype(a.dtypes.to_dict()))


def test_devkit_materialization_limit(devkit_tables):
    road, objects, cams = devkit_tables
    with pytest.raises(MaterializationLimit):
        run_devkit_query(objects, cams, road.df, query("Q4"), max_combinations=100)


def test_devkit_handles_lane_heading_predicates(devkit_tables):
    road, objects, cams = devkit_tables
    pred = P.And(
        (
            P.type_in(P.obj(0), "car"),
            P.contains(P.geo_construct("lane"), P.obj(0)),
            P.same_direction(P.geo_construct("lane"), P.obj(0)),
        )
    )
    out = run_devkit_query(objects, cams, road.df, pred)
    assert set(out.columns) == {"video_id", "frame_idx", "oid_0"}


# ---------------------------------------------------------------- OTIF


def test_otif_reduced_rate_and_gating(tiny_sdfs, tiny_ds):
    cams, gt, _ = tiny_sdfs
    tracked, cost, counts = run_otif(cams, gt, track_every=2)
    assert counts["frames_total"] == tiny_ds.n_frames
    assert counts["frames_detected"] <= tiny_ds.n_frames
    assert counts["frames_tracked"] <= counts["frames_total"] / 2 + 1
    assert cost.ms("otif_proxy") > 0
    assert OTIF_TRAINING_MS > 3_600_000  # reported separately
    assert tracked.count() > 0


# ---------------------------------------------------------------- SkyQuery


@pytest.fixture(scope="module")
def sky(spark):
    # 420 frames: covers the bike-lane leg AND part of the block-interior
    # leg (which starts ~frame 240) so the RVP has frames to prune.
    ds = skyquery_lite(seed=0, n_frames=420)
    return ds, (
        spark.createDataFrame(ds.cameras),
        spark.createDataFrame(ds.gt),
        spark.createDataFrame(ds.road.df.to_dict("records"), schema=ROAD_SCHEMA),
    )


def test_skyquery_processes_all_frames(sky):
    ds, (cams, gt, road) = sky
    _, cost, counts = run_skyquery(cams, gt)
    assert counts["frames_processed"] == counts["frames_total"] == 420
    assert cost.ms("yolov3") > 0


def test_spatialyze_prunes_aerial_frames(sky):
    ds, (cams, gt, road) = sky
    _, cost_sq, counts_sq = run_skyquery(cams, gt)
    _, cost_sp, counts_sp = run_spatialyze_with_skyquery_models(cams, gt, road)
    # The drone's block-interior leg has no bike lane in view: pruned.
    assert counts_sp["frames_processed"] < counts_sp["frames_total"]
    assert cost_sp.total_ms < cost_sq.total_ms  # the §7.1.5 18 % speedup
