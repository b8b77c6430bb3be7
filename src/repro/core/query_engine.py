"""§5.2.3 Movable Objects Query Engine.

The MobilityDB metadata store of the paper becomes Spark SQL over three
tables:

* ``movable_objects`` — one row per (video, track, frame) with the 3D
  location plus track-derived columns (heading, speed, turn_left,
  stopped) computed with Catalyst window functions;
* the per-frame ``cameras`` table;
* the ``road`` Geographic Constructs table (bbox columns standing in
  for the spatial index: containment joins pre-filter on bbox ranges —
  plain Catalyst range predicates — before the exact point-in-polygon
  test).

``compile_filter`` translates an S-Flow predicate AST into a joined,
filtered DataFrame: multi-object predicates become self-joins on
(video_id, frame_idx) (the "temporal index" equi-join of the paper);
``contains`` joins against road polygons; everything else compiles to
Column expressions.
"""
from __future__ import annotations

from functools import reduce

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.core.predicates import (
    And,
    CameraRef,
    Contains,
    DistanceLt,
    Entity,
    GeoRef,
    HeadingDiffBetween,
    Not,
    ObjectRef,
    Or,
    Predicate,
    Stopped,
    TurnLeft,
    TypeIn,
    camera_used,
    geo_refs,
    object_refs,
    object_type_constraints,
)
from repro.geo.polygon import points_in_polygon

__all__ = ["movable_objects", "compile_filter", "result_key_columns", "combination_count"]

TURN_WINDOW_S = 2.5
TURN_MIN_DEG = 30.0
TURN_MAX_DEG = 150.0
STOP_WINDOW_S = 1.0
STOP_SPEED_MPS = 0.5


@F.pandas_udf(T.BooleanType())
def _pip_udf(xs: pd.Series, ys: pd.Series, polys: pd.Series) -> pd.Series:
    """Exact point-in-polygon for (x, y, polygon) row triples."""
    out = np.zeros(len(xs), dtype=bool)
    for i, (x, y, poly) in enumerate(zip(xs, ys, polys)):
        if poly is not None and x == x and y == y:  # NaN-safe
            p = np.asarray([list(v) for v in poly], dtype=np.float64)
            out[i] = points_in_polygon(np.array([x]), np.array([y]), p)[0]
    return pd.Series(out)


def _circ_diff(a: Column, b: Column) -> Column:
    d = F.abs(a - b) % 360.0
    return F.least(d, 360.0 - d)


def movable_objects(tracked: DataFrame, *, fps: float) -> DataFrame:
    """Movable Objects table (§4.1.3) from the video processor's output.

    Adds per-track derived columns: majority-vote type, motion heading,
    speed, and the windowed ``turn_left`` / ``stopped`` flags. All via
    Catalyst window/aggregate functions over the (video, track) key.
    """
    base = tracked.filter(F.col("track_id") >= 0).select(
        "video_id",
        "frame_idx",
        "ts",
        F.col("track_id").alias("oid"),
        "otype",
        F.col("wx").alias("x"),
        F.col("wy").alias("y"),
        F.col("wz").alias("z"),
    )
    maj = (
        base.groupBy("video_id", "oid")
        .agg(F.mode("otype").alias("maj_type"))
    )
    base = base.join(maj, on=["video_id", "oid"]).drop("otype").withColumnRenamed(
        "maj_type", "otype"
    )
    # Motion over a 3-sample baseline when available (smooths detector
    # jitter on the estimated locations), falling back to adjacent
    # samples for short tracks. Each (dx, dy, dt) triple comes from the
    # SAME baseline so speeds stay consistent.
    w = Window.partitionBy("video_id", "oid").orderBy("frame_idx")
    K = 3
    cases = []
    for kind, k in (("lead", K), ("lag", K), ("lead", 1), ("lag", 1)):
        fn = F.lead if kind == "lead" else F.lag
        sign = 1.0 if kind == "lead" else -1.0
        cases.append(
            (
                fn("x", k).over(w).isNotNull(),
                sign * (fn("x", k).over(w) - F.col("x")),
                sign * (fn("y", k).over(w) - F.col("y")),
                sign * (fn("ts", k).over(w) - F.col("ts")),
            )
        )
    dx = dy = dt = None
    for cond, cdx, cdy, cdt in reversed(cases):
        dx = cdx if dx is None else F.when(cond, cdx).otherwise(dx)
        dy = cdy if dy is None else F.when(cond, cdy).otherwise(dy)
        dt = cdt if dt is None else F.when(cond, cdt).otherwise(dt)
    moving = F.sqrt(dx * dx + dy * dy) > 1e-3
    base = base.withColumn(
        "heading",
        F.when(moving, (F.degrees(F.atan2(dy, dx)) + 360.0) % 360.0),
    ).withColumn(
        "speed",
        F.when(dt > 0, F.sqrt(dx * dx + dy * dy) / dt).otherwise(F.lit(0.0)),
    )
    # Range windows over time need an integral order key: milliseconds.
    # turn_left is centered: the heading ~1.25 s ahead minus the heading
    # ~1.25 s behind turned CCW by 30-150 deg — true *during* the turn
    # (a leading-only window fires before the car reaches the turn).
    base = base.withColumn("ts_ms", (F.col("ts") * 1000.0).cast("long"))
    half = int(TURN_WINDOW_S * 1000 / 2)
    w_past = Window.partitionBy("video_id", "oid").orderBy("ts_ms").rangeBetween(-half, 0)
    w_future = Window.partitionBy("video_id", "oid").orderBy("ts_ms").rangeBetween(0, half)
    past_heading = F.first("heading", ignorenulls=True).over(w_past)
    future_heading = F.last("heading", ignorenulls=True).over(w_future)
    ccw = ((future_heading - past_heading) + 540.0) % 360.0 - 180.0
    base = base.withColumn(
        "turn_left", F.coalesce((ccw > TURN_MIN_DEG) & (ccw < TURN_MAX_DEG), F.lit(False))
    )
    ws = (
        Window.partitionBy("video_id", "oid")
        .orderBy("ts_ms")
        .rangeBetween(-int(STOP_WINDOW_S * 1000), int(STOP_WINDOW_S * 1000))
    )
    base = base.withColumn(
        "stopped",
        F.coalesce(F.avg("speed").over(ws) < STOP_SPEED_MPS, F.lit(False)),
    )
    return base.drop("ts_ms")


def combination_count(objects: DataFrame, pred: Predicate) -> int:
    """Number of ordered object tuples the self-join evaluates — the
    work measure of the query-engine stage. With k object refs and n_f
    objects in frame f, it is sum_f n_f*(n_f-1)*...*(n_f-k+1); k=1
    degenerates to the row count. This is why §7.1.1's Q8 (two
    self-joins) costs Spatialyze as much as EVA's simple count."""
    from repro.core.predicates import object_refs as _refs

    k = len(_refs(pred))
    per = objects.groupBy("video_id", "frame_idx").count()
    expr = F.lit(1.0)
    for i in range(k):
        expr = expr * F.greatest(F.col("count") - i, F.lit(0))
    total = per.agg(F.sum(expr)).first()[0]
    return int(total or 0)


def _alias_of(e: Entity) -> str:
    if isinstance(e, ObjectRef):
        return f"o{e.idx}"
    if isinstance(e, CameraRef):
        return "cam"
    return f"g_{e.gtype}_{e.idx}"


def _xy(e: Entity) -> tuple[Column, Column]:
    a = _alias_of(e)
    if isinstance(e, CameraRef):
        return F.col("cam.cam_x"), F.col("cam.cam_y")
    if isinstance(e, ObjectRef):
        return F.col(f"{a}.x"), F.col(f"{a}.y")
    raise TypeError(f"no point location for {e}")


def _heading(e: Entity) -> Column:
    a = _alias_of(e)
    if isinstance(e, CameraRef):
        return F.col("cam.cam_heading")
    if isinstance(e, ObjectRef):
        return F.col(f"{a}.heading")
    return F.col(f"{a}.heading")  # GeoRef: the segment heading


def _compile_expr(pred: Predicate) -> Column:
    if isinstance(pred, And):
        return reduce(lambda a, b: a & b, (_compile_expr(p) for p in pred.parts))
    if isinstance(pred, Or):
        return reduce(lambda a, b: a | b, (_compile_expr(p) for p in pred.parts))
    if isinstance(pred, Not):
        return ~_compile_expr(pred.part)
    if isinstance(pred, TypeIn):
        return F.col(f"{_alias_of(pred.obj)}.otype").isin(*pred.types)
    if isinstance(pred, Contains):
        g = _alias_of(pred.geo)
        conds = []
        for s in pred.subjects:
            sx, sy = _xy(s)
            conds.append(
                (sx >= F.col(f"{g}.xmin")) & (sx <= F.col(f"{g}.xmax"))
                & (sy >= F.col(f"{g}.ymin")) & (sy <= F.col(f"{g}.ymax"))
                & _pip_udf(sx, sy, F.col(f"{g}.poly"))
            )
        return reduce(lambda a, b: a & b, conds)
    if isinstance(pred, DistanceLt):
        ax, ay = _xy(pred.a)
        bx, by = _xy(pred.b)
        return F.sqrt((ax - bx) ** 2 + (ay - by) ** 2) < pred.meters
    if isinstance(pred, HeadingDiffBetween):
        d = _circ_diff(_heading(pred.a), _heading(pred.b))
        return (d >= pred.lo) & (d <= pred.hi)
    if isinstance(pred, TurnLeft):
        return F.col(f"{_alias_of(pred.obj)}.turn_left")
    if isinstance(pred, Stopped):
        return F.col(f"{_alias_of(pred.obj)}.stopped")
    raise TypeError(f"cannot compile {pred!r}")


def result_key_columns(pred: Predicate) -> list[str]:
    cols = ["video_id", "frame_idx"]
    for r in object_refs(pred):
        cols.append(f"oid_{r.idx}")
    return cols


def compile_filter(
    objects: DataFrame, cameras: DataFrame, road: DataFrame, pred: Predicate
) -> DataFrame:
    """Compile + execute a predicate; returns matching combination rows.

    Output: video_id, frame_idx, ts, and per-object oid_i/otype_i/x_i/y_i
    columns. Multi-object predicates self-join ``objects`` on
    (video_id, frame_idx); symmetric same-type pairs are deduplicated by
    requiring increasing oids.
    """
    refs = object_refs(pred)
    cons = object_type_constraints(pred)
    df: DataFrame | None = None
    for r in refs:
        o = objects.alias(_alias_of(r))
        if df is None:
            df = o
        else:
            df = df.join(
                o,
                (F.col(f"{_alias_of(refs[0])}.video_id") == F.col(f"{_alias_of(r)}.video_id"))
                & (F.col(f"{_alias_of(refs[0])}.frame_idx") == F.col(f"{_alias_of(r)}.frame_idx")),
                "inner",
            )
    if df is None:
        raise ValueError("predicate references no objects")
    a0 = _alias_of(refs[0])
    # Distinctness across object refs: '<' for interchangeable same-type
    # refs (dedup symmetric pairs), '!=' otherwise.
    for i, ri in enumerate(refs):
        for rj in refs[i + 1 :]:
            same = cons is not None and cons.get(ri.idx) == cons.get(rj.idx)
            ci = F.col(f"{_alias_of(ri)}.oid")
            cj = F.col(f"{_alias_of(rj)}.oid")
            df = df.filter(ci < cj if same else ci != cj)
    if camera_used(pred):
        cam = cameras.alias("cam")
        df = df.join(
            cam,
            (F.col(f"{a0}.video_id") == F.col("cam.video_id"))
            & (F.col(f"{a0}.frame_idx") == F.col("cam.frame_idx")),
            "inner",
        )
    for g in geo_refs(pred):
        ga = _alias_of(g)
        df = df.join(
            road.filter(F.col("type") == g.gtype).alias(ga),
            how="cross",
        )
    df = df.filter(_compile_expr(pred))
    out_cols = [
        F.col(f"{a0}.video_id").alias("video_id"),
        F.col(f"{a0}.frame_idx").alias("frame_idx"),
        F.col(f"{a0}.ts").alias("ts"),
    ]
    for r in refs:
        a = _alias_of(r)
        out_cols += [
            F.col(f"{a}.oid").alias(f"oid_{r.idx}"),
            F.col(f"{a}.otype").alias(f"otype_{r.idx}"),
            F.col(f"{a}.x").alias(f"x_{r.idx}"),
            F.col(f"{a}.y").alias(f"y_{r.idx}"),
        ]
    return df.select(*out_cols).dropDuplicates(result_key_columns(pred))
