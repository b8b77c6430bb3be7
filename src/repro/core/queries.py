"""The ten evaluation queries of Table 1, as S-Flow predicate builders.

Every query also constrains objects to be closer than 50 m of the camera
(§7 "All queries look for objects closer than 50 meters").
"""
from __future__ import annotations

from repro.core.predicates import (
    And,
    Predicate,
    camera,
    contains,
    distance_lt,
    geo_construct,
    obj,
    opposite,
    perpendicular,
    same_direction,
    stopped,
    turn_left,
    type_in,
)

__all__ = ["QUERIES", "query"]


def _near_cam(*objects) -> list:
    return [distance_lt(camera(), o, 50.0) for o in objects]


def q1() -> Predicate:
    """A pedestrian at an intersection facing perpendicularly to the camera."""
    person = obj(0)
    return And(
        (
            type_in(person, "person"),
            contains(geo_construct("intersection"), person),
            perpendicular(person, camera()),
            *_near_cam(person),
        )
    )


def q2() -> Predicate:
    """2 cars at an intersection moving in opposite directions."""
    car1, car2 = obj(0), obj(1)
    return And(
        (
            type_in(car1, "car"),
            type_in(car2, "car"),
            contains(geo_construct("intersection"), [car1, car2]),
            opposite(car1, car2),
            *_near_cam(car1, car2),
        )
    )


def q3() -> Predicate:
    """Camera opposite to the lane direction, another car in that lane
    moving with the lane, within 10 m of the camera."""
    car = obj(0)
    lane = geo_construct("lane")
    return And(
        (
            type_in(car, "car"),
            contains(lane, [camera(), car]),
            opposite(lane, camera()),
            same_direction(lane, car),
            distance_lt(camera(), car, 10.0),
        )
    )


def q4() -> Predicate:
    """A car with the camera on one lane (same direction); 2 other cars
    moving together on an opposite lane."""
    car1, car2, car3 = obj(0), obj(1), obj(2)
    lane1 = geo_construct("lane", 0)
    lane2 = geo_construct("lane", 1)
    return And(
        (
            type_in(car1, "car"),
            type_in(car2, "car"),
            type_in(car3, "car"),
            contains(lane1, [car1, camera()]),
            same_direction(car1, camera()),
            contains(lane2, [car2, car3]),
            same_direction(car2, car3),
            opposite(lane1, lane2),
            *_near_cam(car1, car2, car3),
        )
    )


def q5() -> Predicate:
    """A pedestrian is at an intersection."""
    person = obj(0)
    return And(
        (
            type_in(person, "person"),
            contains(geo_construct("intersection"), person),
            *_near_cam(person),
        )
    )


def q6() -> Predicate:
    """2 cars are at an intersection."""
    car1, car2 = obj(0), obj(1)
    return And(
        (
            type_in(car1, "car"),
            type_in(car2, "car"),
            contains(geo_construct("intersection"), [car1, car2]),
            *_near_cam(car1, car2),
        )
    )


def q7() -> Predicate:
    """A car on a lane within 10 m of the camera (camera on a lane)."""
    car = obj(0)
    return And(
        (
            type_in(car, "car"),
            contains(geo_construct("lane"), camera()),
            distance_lt(camera(), car, 10.0),
        )
    )


def q8() -> Predicate:
    """3 cars, each on a lane."""
    cars = [obj(i) for i in range(3)]
    return And(
        (
            *[type_in(c, "car") for c in cars],
            *[contains(geo_construct("lane", i), c) for i, c in enumerate(cars)],
            *_near_cam(*cars),
        )
    )


def q9() -> Predicate:
    """A car turning left with a pedestrian at an intersection."""
    car, person = obj(0), obj(1)
    inter = geo_construct("intersection")
    return And(
        (
            type_in(car, "car"),
            type_in(person, "person"),
            contains(inter, [car, person]),
            turn_left(car),
            *_near_cam(car, person),
        )
    )


def q10() -> Predicate:
    """A car stopped in a cycling lane."""
    car = obj(0)
    return And(
        (
            type_in(car, "car"),
            contains(geo_construct("bikeLane"), car),
            stopped(car),
            *_near_cam(car),
        )
    )


QUERIES = {f"Q{i}": fn for i, fn in enumerate([q1, q2, q3, q4, q5, q6, q7, q8, q9, q10], start=1)}


def query(name: str) -> Predicate:
    """Build the predicate for a Table 1 query name like 'Q3'."""
    return QUERIES[name]()
