"""Tests for the S-Flow predicate AST and its analysis."""
import pytest

from repro.core import predicates as P
from repro.core.queries import QUERIES, query


def test_constructors():
    o = P.obj(1)
    assert o.idx == 1
    assert P.geo_construct("lane", 2).gtype == "lane"
    t = P.type_in(o, "car", "truck")
    assert t.types == ("car", "truck")
    c = P.contains(P.geo_construct("lane"), [o, P.camera()])
    assert len(c.subjects) == 2
    c1 = P.contains(P.geo_construct("lane"), o)
    assert c1.subjects == (o,)


def test_sugar_predicates():
    a, b = P.obj(0), P.camera()
    assert (P.perpendicular(a, b).lo, P.perpendicular(a, b).hi) == (70.0, 110.0)
    assert P.opposite(a, b).hi == 180.0
    assert P.same_direction(a, b).lo == 0.0


def test_conjuncts_flattens_nested_and():
    o = P.obj(0)
    p = P.And((P.And((P.type_in(o, "car"), P.stopped(o))), P.turn_left(o)))
    assert len(P.conjuncts(p)) == 3


def test_conjuncts_keeps_or_whole():
    o = P.obj(0)
    p = P.Or((P.type_in(o, "car"), P.stopped(o)))
    assert P.conjuncts(p) == [p]


def test_object_refs_sorted_unique():
    p = P.And((P.type_in(P.obj(2), "car"), P.type_in(P.obj(0), "car"),
               P.distance_lt(P.obj(2), P.obj(0), 5)))
    assert [r.idx for r in P.object_refs(p)] == [0, 2]


def test_geo_refs_and_camera_used():
    p = query("Q4")
    refs = P.geo_refs(p)
    assert [(g.gtype, g.idx) for g in refs] == [("lane", 0), ("lane", 1)]
    assert P.camera_used(p)
    assert not P.camera_used(P.type_in(P.obj(0), "car"))


def test_object_type_constraints_full():
    cons = P.object_type_constraints(query("Q2"))
    assert cons == {0: frozenset({"car"}), 1: frozenset({"car"})}


def test_object_type_constraints_missing_is_none():
    o = P.obj(0)
    p = P.contains(P.geo_construct("lane"), o)  # no TypeIn
    assert P.object_type_constraints(p) is None


def test_object_type_constraints_in_or_not_counted():
    o = P.obj(0)
    p = P.Or((P.type_in(o, "car"), P.stopped(o)))
    assert P.object_type_constraints(p) is None


def test_rvp_geo_types():
    assert P.rvp_geo_types(query("Q1")) == {"intersection"}
    assert P.rvp_geo_types(query("Q4")) == {"lane"}
    assert P.rvp_geo_types(query("Q10")) == {"bikeLane"}


def test_rvp_distance_default_and_tightest():
    assert P.rvp_distance(query("Q1")) == 50.0
    assert P.rvp_distance(query("Q3")) == 10.0  # distance(camera, car) < 10
    assert P.rvp_distance(P.type_in(P.obj(0), "car")) == 50.0


def test_required_capabilities():
    assert P.required_capabilities(P.type_in(P.obj(0), "car")) == {"detection"}
    caps5 = P.required_capabilities(query("Q5"))
    assert caps5 == {"detection", "loc3d"}
    caps1 = P.required_capabilities(query("Q1"))
    assert caps1 == {"detection", "loc3d", "tracks"}
    caps10 = P.required_capabilities(query("Q10"))
    assert "tracks" in caps10


def test_distance_between_geo_and_lane_heading_allowed():
    # Q3's opposite(lane, camera): heading over a GeoRef is legal.
    p = P.opposite(P.geo_construct("lane"), P.camera())
    assert isinstance(p, P.HeadingDiffBetween)


def test_all_queries_build():
    for name in QUERIES:
        pred = query(name)
        assert P.object_refs(pred), name
        assert P.required_capabilities(pred), name


def test_walk_covers_all_nodes():
    p = query("Q9")
    kinds = {type(n).__name__ for n in P.walk(p)}
    assert {"And", "TypeIn", "Contains", "TurnLeft", "DistanceLt"} <= kinds
