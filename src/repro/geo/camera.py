"""Pinhole camera model: the paper's Eq. 1-7.

Implements, vectorized over frames/points:

* world→pixel projection (Eq. 1 + extrinsic inverse) — used by the
  synthetic object detector to produce 2D boxes from ground-truth 3D
  boxes;
* pixel→world at a known depth (Eq. 5) — used for the view pyramid;
* the 4 frame corners at distance ``d`` in world coordinates (Eq. 6) —
  the Road Visibility Pruner's viewable space;
* the ray–ground intersection (Eq. 7 solved for ``d`` with z=0) — the
  Geometry-Based 3D Location Estimator.

Intrinsics are ``(fx, fy, s, x0, y0)`` per Eq. 1. Extrinsics are the
camera position ``t`` (world) and rotation matrix ``R`` with
``R @ v_cam = v_world`` (Eq. 4's ``[R|t]``).
"""
from __future__ import annotations

import numpy as np

from repro.geo.quaternion import quat_to_matrix

__all__ = [
    "intrinsic_matrix",
    "world_to_pixel",
    "pixel_to_world",
    "view_corners",
    "view_hull_points",
    "ray_ground_intersection",
]


def intrinsic_matrix(fx, fy, s, x0, y0) -> np.ndarray:
    """Build (n,3,3) intrinsic matrices from per-frame scalar arrays."""
    fx, fy, s, x0, y0 = np.broadcast_arrays(
        *[np.asarray(v, dtype=np.float64) for v in (fx, fy, s, x0, y0)]
    )
    n = fx.shape[0] if fx.ndim else 1
    k = np.zeros((n, 3, 3))
    k[:, 0, 0], k[:, 0, 1], k[:, 0, 2] = fx, s, x0
    k[:, 1, 1], k[:, 1, 2] = fy, y0
    k[:, 2, 2] = 1.0
    return k


def world_to_pixel(
    pts: np.ndarray, t: np.ndarray, q: np.ndarray, k: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """Project world points into pixels, one camera per point.

    ``pts``/``t``: (n,3); ``q``: (n,4) quaternions; ``k``: (n,3,3).
    Returns ``(pix, z_cam)`` where ``pix`` is (n,2) pixel coordinates and
    ``z_cam`` the forward distance (n,) — points with ``z_cam <= 0`` are
    behind the camera and their pixels are meaningless.
    """
    r = quat_to_matrix(q)  # (n,3,3), camera→world
    cam = np.einsum("nji,nj->ni", r, pts - t)  # world→camera: R^T (p - t)
    z = cam[:, 2]
    with np.errstate(divide="ignore", invalid="ignore"):
        proj = np.einsum("nij,nj->ni", k, cam) / z[:, None]
    return proj[:, :2], z


def pixel_to_world(
    xp: np.ndarray, yp: np.ndarray, zc: np.ndarray, t: np.ndarray, q: np.ndarray, k: np.ndarray
) -> np.ndarray:
    """Eq. 5: pixel (xp, yp) at camera depth ``zc`` → world point. All (n,...)."""
    r = quat_to_matrix(q)
    kinv = np.linalg.inv(k)
    pix = np.stack([xp * zc, yp * zc, zc], axis=-1)  # (n,3) = [xp*zc, yp*zc, zc]
    cam = np.einsum("nij,nj->ni", kinv, pix)
    return np.einsum("nij,nj->ni", r, cam) + t


def view_corners(t: np.ndarray, q: np.ndarray, k: np.ndarray, w, h, d: float) -> np.ndarray:
    """Eq. 6: world coordinates of the 4 frame corners at distance ``d``.

    Returns (n, 4, 3) for corners (0,0), (w,0), (w,h), (0,h).
    """
    n = t.shape[0]
    w = np.broadcast_to(np.asarray(w, dtype=np.float64), (n,))
    h = np.broadcast_to(np.asarray(h, dtype=np.float64), (n,))
    zeros = np.zeros(n)
    corners = []
    for cx, cy in ((zeros, zeros), (w, zeros), (w, h), (zeros, h)):
        corners.append(pixel_to_world(cx, cy, np.full(n, d), t, q, k))
    return np.stack(corners, axis=1)


def view_hull_points(t: np.ndarray, q: np.ndarray, k: np.ndarray, w, h, d: float) -> np.ndarray:
    """§6.1: the 5 points (camera apex + 4 corners at distance d) projected
    onto z=0, ready for a convex hull. Returns (n, 5, 2)."""
    corners = view_corners(t, q, k, w, h, d)[..., :2]  # drop z, per the paper
    apex = t[:, None, :2]
    return np.concatenate([apex, corners], axis=1)


def ray_ground_intersection(
    xp: np.ndarray, yp: np.ndarray, t: np.ndarray, q: np.ndarray, k: np.ndarray
) -> tuple[np.ndarray, np.ndarray]:
    """Eq. 7 solved for the ground plane z=0 (§6.3).

    The ray of pixel (xp, yp) is ``world(d) = R @ Kinv @ [xp*d, yp*d, d] + t``
    (d = camera-frame depth). Its z component is linear in d:
    ``z(d) = dir_z * d + t_z = 0`` → ``d = -t_z / dir_z``.

    Returns ``(pts, d)``: (n,3) world points (z exactly 0 where valid) and
    the (n,) depth. ``d <= 0`` means the ground intersection is behind the
    camera — the paper's fallback-to-Monodepth2 condition.
    """
    r = quat_to_matrix(q)
    kinv = np.linalg.inv(k)
    pix = np.stack([xp, yp, np.ones_like(np.asarray(xp, dtype=np.float64))], axis=-1)
    direction = np.einsum("nij,nj->ni", r, np.einsum("nij,nj->ni", kinv, pix))
    with np.errstate(divide="ignore", invalid="ignore"):
        d = -t[:, 2] / direction[:, 2]
    d = np.where(np.isfinite(d), d, -1.0)
    pts = direction * d[:, None] + t
    return pts, d
