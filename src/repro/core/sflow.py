"""S-Flow's World — the build-filter-observe facade (§3, §4.2.4).

    w = World(spark)
    w.add_geog_constructs(road_network)
    w.add_video(GeospatialVideo(cameras_pdf, content_pdf, fps))
    w.filter(type_in(o, 'car', 'truck'))
    w.filter(contains(geo_construct('intersection'), o))
    manifest, cost = w.save_videos()

Execution is deferred (§5): nothing runs until an observer
(``get_objects`` / ``save_videos``) is called; the planner then analyses
the conjunction of all filters, builds the optimized video-processing
plan, runs it, streams the Movable Objects into the query engine, and
composes the output — accumulating the modeled cost of all four stages
(§5.2: Data Integrator, Video Processor, Movable Objects Query Engine,
Output Composer).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.output import get_objects, save_videos
from repro.core.pipeline import VPResult, run_video_processor
from repro.core.planner import ALL_OPTIMIZATIONS, Plan, plan_workflow
from repro.core.predicates import And, Predicate
from repro.core.query_engine import combination_count, compile_filter, movable_objects
from repro.video.costmodel import C, CostReport
from repro.world.datasets import ROAD_SCHEMA, Dataset
from repro.world.roadnetwork import RoadNetwork

__all__ = ["GeospatialVideo", "World"]


@dataclass
class GeospatialVideo:
    """A video bound to its camera (§4.2.2): per-frame camera configs +
    the video's visual content (here: the ground-truth state table the
    synthetic detector renders from)."""

    cameras: pd.DataFrame
    content: pd.DataFrame
    fps: float


class World:
    """A geospatial virtual environment (§4.1.1)."""

    def __init__(
        self,
        spark: SparkSession,
        *,
        optimizations: frozenset[str] | set[str] = ALL_OPTIMIZATIONS,
        tracker_variant: str = "strongsort",
        seed: int = 0,
    ):
        self.spark = spark
        self.optimizations = frozenset(optimizations)
        self.tracker_variant = tracker_variant
        self.seed = seed
        self._road: RoadNetwork | None = None
        self._videos: list[GeospatialVideo] = []
        self._preds: list[Predicate] = []
        self._vp: VPResult | None = None
        self._plan: Plan | None = None

    # ------------------------------------------------------------ build
    def add_geog_constructs(self, road: RoadNetwork) -> "World":
        self._road = road
        return self

    def add_video(self, video: GeospatialVideo) -> "World":
        if self._videos and self._videos[0].fps != video.fps:
            raise ValueError("all videos in a World must share fps")
        self._videos.append(video)
        self._vp = None
        return self

    @classmethod
    def from_dataset(cls, spark: SparkSession, ds: Dataset, **kw) -> "World":
        w = cls(spark, **kw)
        w.add_geog_constructs(ds.road)
        w.add_video(GeospatialVideo(ds.cameras, ds.gt, ds.fps))
        return w

    # ------------------------------------------------------------ filter
    def filter(self, pred: Predicate) -> "World":
        self._preds.append(pred)
        self._vp = None
        return self

    @property
    def predicate(self) -> Predicate:
        if not self._preds:
            raise ValueError("filter() the World before observing it")
        return self._preds[0] if len(self._preds) == 1 else And(tuple(self._preds))

    @property
    def fps(self) -> float:
        return self._videos[0].fps

    # ------------------------------------------------------------ internals
    def _tables(self) -> tuple[DataFrame, DataFrame, DataFrame]:
        cams = pd.concat([v.cameras for v in self._videos], ignore_index=True)
        gt = pd.concat([v.content for v in self._videos], ignore_index=True)
        assert self._road is not None, "add_geog_constructs() first"
        road = self.spark.createDataFrame(self._road.df.to_dict("records"), schema=ROAD_SCHEMA)
        return (
            self.spark.createDataFrame(cams),
            self.spark.createDataFrame(gt),
            road,
        )

    def execute(self) -> tuple[DataFrame, CostReport]:
        """Run all four stages; returns (query result, total cost)."""
        pred = self.predicate
        self._plan = plan_workflow(
            pred, optimizations=self.optimizations, tracker_variant=self.tracker_variant
        )
        cams, gt, road = self._tables()
        cost = CostReport()
        # ① Data Integrator: road tables + frame-by-frame video x camera join.
        n_constructs = len(self._road.df)
        n_frames = len(pd.concat([v.cameras for v in self._videos]))
        cost.add("integrate", n_constructs + n_frames,
                 n_constructs * C.INTEGRATE_CONSTRUCT + n_frames * C.INTEGRATE_FRAME)
        # ② Video Processor.
        vp = run_video_processor(
            cams, gt, road, self._plan, fps=self.fps, road_pdf=self._road.df, seed=self.seed
        )
        self._vp = vp
        cost.merge(vp.cost)
        # ③ Movable Objects Query Engine.
        objects = movable_objects(vp.objects, fps=self.fps).persist()
        # The engine's work scales with the self-join combinations it
        # evaluates (k object refs → k-way temporal-index self-join).
        n_comb = combination_count(objects, pred)
        cost.add("query_engine", n_comb, n_comb * C.QUERY_ROW)
        result = compile_filter(objects, cams, road, pred).persist()
        vp.counts["result_rows"] = result.count()
        return result, cost

    # ------------------------------------------------------------ observe
    def get_objects(self) -> tuple[pd.DataFrame, CostReport]:
        result, cost = self.execute()
        objs = get_objects(result, self.predicate)
        out = objs.toPandas()
        cost.add("compose", len(out), len(out) * C.COMPOSE_FRAME)
        return out, cost

    def save_videos(self, path: str | None = None) -> tuple[pd.DataFrame, CostReport]:
        result, cost = self.execute()
        manifest = save_videos(result, path).toPandas()
        n_frames_out = int(manifest["n_frames"].sum()) if len(manifest) else 0
        cost.add("compose", n_frames_out, n_frames_out * C.COMPOSE_FRAME)
        return manifest, cost

    @property
    def plan(self) -> Plan:
        if self._plan is None:
            self._plan = plan_workflow(
                self.predicate,
                optimizations=self.optimizations,
                tracker_variant=self.tracker_variant,
            )
        return self._plan

    @property
    def vp_result(self) -> VPResult:
        assert self._vp is not None, "observe the World first"
        return self._vp
