"""Unit tests for the camera model (paper Eq. 1-7)."""
import numpy as np
import pytest

from repro.geo.camera import (
    intrinsic_matrix,
    pixel_to_world,
    ray_ground_intersection,
    view_corners,
    view_hull_points,
    world_to_pixel,
)
from repro.geo.quaternion import heading_to_camera_quat

W, H = 1600.0, 900.0
FX = FY = 1200.0
CX, CY = W / 2, H / 2


def cam(heading=0.0, pos=(0.0, 0.0, 1.5), pitch=0.0):
    t = np.array([pos], dtype=np.float64)
    q = heading_to_camera_quat(heading, pitch)[None, :]
    k = intrinsic_matrix([FX], [FY], [0.0], [CX], [CY])
    return t, q, k


def test_intrinsic_matrix_layout():
    k = intrinsic_matrix([10.0], [20.0], [1.0], [3.0], [4.0])[0]
    np.testing.assert_allclose(k, [[10, 1, 3], [0, 20, 4], [0, 0, 1]])


def test_point_on_optical_axis_projects_to_center():
    t, q, k = cam(heading=0.0)
    pix, z = world_to_pixel(np.array([[10.0, 0.0, 1.5]]), t, q, k)
    np.testing.assert_allclose(pix[0], [CX, CY], atol=1e-9)
    assert z[0] == pytest.approx(10.0)


def test_point_behind_camera_flagged():
    t, q, k = cam(heading=0.0)
    _, z = world_to_pixel(np.array([[-5.0, 0.0, 1.5]]), t, q, k)
    assert z[0] < 0


def test_point_left_of_heading_projects_left_of_center():
    # Heading east; a point to the north (left of travel) has pixel x < cx.
    t, q, k = cam(heading=0.0)
    pix, z = world_to_pixel(np.array([[10.0, 2.0, 1.5]]), t, q, k)
    assert z[0] > 0 and pix[0, 0] < CX


def test_point_below_camera_height_projects_low_in_image():
    # Pixel y grows downward; ground points appear below the center line.
    t, q, k = cam(heading=0.0)
    pix, _ = world_to_pixel(np.array([[10.0, 0.0, 0.0]]), t, q, k)
    assert pix[0, 1] > CY


def test_pixel_world_roundtrip():
    t, q, k = cam(heading=37.0)
    pts = np.array([[12.0, 5.0, 0.4]])
    pix, z = world_to_pixel(pts, t, q, k)
    back = pixel_to_world(pix[:, 0], pix[:, 1], z, t, q, k)
    np.testing.assert_allclose(back, pts, atol=1e-8)


def test_pixel_world_roundtrip_batch_random():
    rng = np.random.default_rng(7)
    n = 200
    t = np.column_stack([rng.uniform(-50, 50, n), rng.uniform(-50, 50, n), np.full(n, 1.5)])
    q = np.stack([heading_to_camera_quat(h) for h in rng.uniform(0, 360, n)])
    k = intrinsic_matrix(np.full(n, FX), np.full(n, FY), np.zeros(n), np.full(n, CX), np.full(n, CY))
    # Points in front of each camera.
    local = np.column_stack([rng.uniform(-5, 5, n), rng.uniform(-2, 2, n), rng.uniform(5, 40, n)])
    from repro.geo.quaternion import quat_to_matrix

    pts = np.einsum("nij,nj->ni", quat_to_matrix(q), local) + t
    pix, z = world_to_pixel(pts, t, q, k)
    assert np.all(z > 0)
    back = pixel_to_world(pix[:, 0], pix[:, 1], z, t, q, k)
    np.testing.assert_allclose(back, pts, atol=1e-7)


def test_view_corners_at_distance_d():
    t, q, k = cam(heading=0.0)
    c = view_corners(t, q, k, W, H, 50.0)
    assert c.shape == (1, 4, 3)
    # All corners are exactly 50 m in front along the optical axis (x, east).
    np.testing.assert_allclose(c[0, :, 0], 50.0, atol=1e-9)
    # Corner layout: (0,0) is top-left => +y (left/north) and higher z.
    tl, tr, br, bl = c[0]
    assert tl[1] > 0 and tr[1] < 0  # left of camera is north
    assert tl[2] > bl[2]  # top corners higher than bottom


def test_view_hull_points_contains_apex():
    t, q, k = cam(heading=90.0, pos=(3.0, 4.0, 1.5))
    hull_pts = view_hull_points(t, q, k, W, H, 50.0)
    assert hull_pts.shape == (1, 5, 2)
    np.testing.assert_allclose(hull_pts[0, 0], [3.0, 4.0])
    # Heading north: all corner points are north of the camera.
    assert np.all(hull_pts[0, 1:, 1] > 4.0)


def test_ray_ground_intersection_center_bottom():
    # A ground point projected to pixels must ray-cast back to itself (z=0).
    t, q, k = cam(heading=0.0)
    pts = np.array([[20.0, 3.0, 0.0]])
    pix, _ = world_to_pixel(pts, t, q, k)
    ground, d = ray_ground_intersection(pix[:, 0], pix[:, 1], t, q, k)
    assert d[0] > 0
    np.testing.assert_allclose(ground[0], pts[0], atol=1e-8)


def test_ray_ground_behind_camera_for_sky_pixel():
    # A pixel above the horizon (small y) never hits the ground in front.
    t, q, k = cam(heading=0.0)
    _, d = ray_ground_intersection(np.array([CX]), np.array([10.0]), t, q, k)
    assert d[0] <= 0


def test_ray_ground_matches_known_distance():
    # Camera at z=1.5 looking east; bottom-center pixel of an object 10 m
    # away on the ground: d such that ground x == 10.
    t, q, k = cam(heading=0.0)
    pix, _ = world_to_pixel(np.array([[10.0, 0.0, 0.0]]), t, q, k)
    ground, d = ray_ground_intersection(pix[:, 0], pix[:, 1], t, q, k)
    assert ground[0, 0] == pytest.approx(10.0)
    assert ground[0, 1] == pytest.approx(0.0, abs=1e-9)


def test_ray_ground_aerial_camera():
    # Top-down camera at 60 m: every pixel hits the ground at depth ~60/cos.
    t = np.array([[5.0, 5.0, 60.0]])
    q = heading_to_camera_quat(0.0, pitch_deg=90.0)[None, :]
    k = intrinsic_matrix([FX], [FY], [0.0], [CX], [CY])
    ground, d = ray_ground_intersection(np.array([CX]), np.array([CY]), t, q, k)
    assert d[0] == pytest.approx(60.0)
    np.testing.assert_allclose(ground[0], [5.0, 5.0, 0.0], atol=1e-9)
