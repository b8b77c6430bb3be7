"""EVA baseline (§7.1.1) — frame-by-frame VDBMS with UDF materialization.

What the paper credits/blames EVA for, reproduced here:

* evaluates queries frame-by-frame — no tracks, no object directions;
* always runs the full detector + Monodepth2 on every frame (no road
  pruning, no type pruning, no geometric shortcut);
* *materializes* UDF outputs: when queries run in series (Q5→Q6→Q7→Q8
  without resetting), later queries reuse the cached detector+depth
  results and pay only per-frame predicate evaluation;
* per-frame Python UDF plumbing cost for every query;
* Q8 semantics: returns frames with >= 3 cars (no self-join) — the
  asymmetry §7.1.1 notes.

The detections themselves come from the same synthetic detector (same
"models"), so only the execution strategy differs — which is exactly
what the comparison measures.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.predicates import Predicate
from repro.core.query_engine import compile_filter, movable_objects
from repro.video.costmodel import C, CostReport
from repro.video.decoder import decode
from repro.video.depth import estimate_3d_depth
from repro.video.detector import detect

__all__ = ["EvaSession"]


@dataclass
class EvaSession:
    """An EVA server session with its materialized-UDF cache."""

    cameras: DataFrame
    gt: DataFrame
    road: DataFrame
    _cache: DataFrame | None = None
    _n_frames: int | None = None

    def _materialized(self, cost: CostReport) -> DataFrame:
        """Detector + depth over every frame; cached across queries."""
        frames = decode(self.cameras)
        if self._n_frames is None:
            self._n_frames = frames.count()
        if self._cache is None:
            dets = detect(frames, self.gt)
            d3 = estimate_3d_depth(dets).persist()
            n_frames_with = d3.select("video_id", "frame_idx").distinct().count()
            cost.add("yolo", self._n_frames, self._n_frames * C.YOLO)
            cost.add("depth", n_frames_with, n_frames_with * C.DEPTH)
            self._cache = d3
        cost.add("decode", self._n_frames, self._n_frames * C.DECODE)
        return self._cache

    def run_query(self, pred: Predicate, *, min_count: int | None = None,
                  count_type: str = "car") -> tuple[DataFrame, CostReport]:
        """Execute one query frame-by-frame.

        ``min_count`` switches to EVA's Q8-style semantics: frames with
        at least that many detections of ``count_type``.
        """
        cost = CostReport()
        d3 = self._materialized(cost)
        n_dets = d3.count()
        # Per-frame, per-query Python UDF predicate evaluation.
        assert self._n_frames is not None
        cost.add("eva_udf", self._n_frames,
                 self._n_frames * C.EVA_UDF_FRAME + n_dets * C.EVA_UDF_OBJ)
        if min_count is not None:
            result = (
                d3.filter(F.col("otype") == count_type)
                .groupBy("video_id", "frame_idx")
                .count()
                .filter(F.col("count") >= min_count)
                .select("video_id", "frame_idx")
            )
            return result, cost
        # EVA evaluates predicates frame-by-frame inside its UDF plumbing
        # (charged above) — there is no metadata-store join stage. The
        # result set is computed with our engine only to have comparable
        # outputs.
        objects = d3.withColumn("track_id", F.col("det_id"))
        obj_table = movable_objects(objects, fps=12.0)
        result = compile_filter(obj_table, self.cameras, self.road, pred)
        return result, cost
