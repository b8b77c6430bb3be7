"""Quaternion / rotation-matrix / heading conversions.

The paper stores camera rotation as a quaternion (§4.1.3) and converts it
to a 3x3 rotation matrix ``R`` for the camera→world extrinsic (Eq. 4).
All functions are vectorized over a leading batch axis where noted.

Conventions
-----------
* World frame: x east, y north, z up. ``heading`` is degrees
  counter-clockwise from east (the paper's convention: a lane direction
  of "181 deg counterclockwise from the east" in §6.4.2).
* Camera frame (paper footnote 3): z forward, x right, y down.
* Quaternions are ``(w, x, y, z)``, unit-norm, rotating camera-frame
  vectors into the world frame (i.e. ``R @ v_cam = v_world``).
"""
from __future__ import annotations

import numpy as np

__all__ = [
    "quat_to_matrix",
    "matrix_to_quat",
    "heading_to_camera_quat",
    "camera_quat_to_heading",
    "heading_diff_deg",
]


def quat_to_matrix(q: np.ndarray) -> np.ndarray:
    """Convert unit quaternion(s) ``(w,x,y,z)`` to rotation matrix/matrices.

    ``q`` has shape (4,) or (n, 4); returns (3, 3) or (n, 3, 3).
    """
    q = np.asarray(q, dtype=np.float64)
    single = q.ndim == 1
    q = np.atleast_2d(q)
    n = np.linalg.norm(q, axis=1, keepdims=True)
    if np.any(n == 0):
        raise ValueError("zero-norm quaternion")
    w, x, y, z = (q / n).T
    m = np.empty((q.shape[0], 3, 3))
    m[:, 0, 0] = 1 - 2 * (y * y + z * z)
    m[:, 0, 1] = 2 * (x * y - w * z)
    m[:, 0, 2] = 2 * (x * z + w * y)
    m[:, 1, 0] = 2 * (x * y + w * z)
    m[:, 1, 1] = 1 - 2 * (x * x + z * z)
    m[:, 1, 2] = 2 * (y * z - w * x)
    m[:, 2, 0] = 2 * (x * z - w * y)
    m[:, 2, 1] = 2 * (y * z + w * x)
    m[:, 2, 2] = 1 - 2 * (x * x + y * y)
    return m[0] if single else m


def matrix_to_quat(m: np.ndarray) -> np.ndarray:
    """Convert a single 3x3 rotation matrix to a unit quaternion (w,x,y,z).

    Uses the Shepperd-style branch on the largest diagonal term for
    numerical stability.
    """
    m = np.asarray(m, dtype=np.float64)
    t = np.trace(m)
    if t > 0:
        s = np.sqrt(t + 1.0) * 2
        q = np.array(
            [0.25 * s, (m[2, 1] - m[1, 2]) / s, (m[0, 2] - m[2, 0]) / s, (m[1, 0] - m[0, 1]) / s]
        )
    elif m[0, 0] >= m[1, 1] and m[0, 0] >= m[2, 2]:
        s = np.sqrt(1.0 + m[0, 0] - m[1, 1] - m[2, 2]) * 2
        q = np.array(
            [(m[2, 1] - m[1, 2]) / s, 0.25 * s, (m[0, 1] + m[1, 0]) / s, (m[0, 2] + m[2, 0]) / s]
        )
    elif m[1, 1] >= m[2, 2]:
        s = np.sqrt(1.0 + m[1, 1] - m[0, 0] - m[2, 2]) * 2
        q = np.array(
            [(m[0, 2] - m[2, 0]) / s, (m[0, 1] + m[1, 0]) / s, 0.25 * s, (m[1, 2] + m[2, 1]) / s]
        )
    else:
        s = np.sqrt(1.0 + m[2, 2] - m[0, 0] - m[1, 1]) * 2
        q = np.array(
            [(m[1, 0] - m[0, 1]) / s, (m[0, 2] + m[2, 0]) / s, (m[1, 2] + m[2, 1]) / s, 0.25 * s]
        )
    # Canonical sign: w >= 0.
    return q if q[0] >= 0 else -q


def _camera_matrix_for_heading(heading_deg: float, pitch_deg: float = 0.0) -> np.ndarray:
    """Rotation matrix of a camera looking along ``heading`` (level horizon).

    Columns are the camera axes (x right, y down, z forward) expressed in
    world coordinates. ``pitch_deg`` > 0 tilts the optical axis downward
    (used by the top-down aerial camera with pitch=90).
    """
    h = np.deg2rad(heading_deg)
    p = np.deg2rad(pitch_deg)
    fwd = np.array([np.cos(h) * np.cos(p), np.sin(h) * np.cos(p), -np.sin(p)])
    right = np.array([np.sin(h), -np.cos(h), 0.0])
    down = np.cross(fwd, right)  # completes the right-handed (x,y,z)=(right,down,fwd) triad
    return np.column_stack([right, down, fwd])


def heading_to_camera_quat(heading_deg: float, pitch_deg: float = 0.0) -> np.ndarray:
    """Quaternion (w,x,y,z) of a camera looking along ``heading_deg``."""
    return matrix_to_quat(_camera_matrix_for_heading(heading_deg, pitch_deg))


def camera_quat_to_heading(q: np.ndarray) -> np.ndarray:
    """Recover camera heading (deg CCW from east, in [0, 360)) from quaternion(s).

    Heading is the azimuth of the optical (camera z) axis projected on the
    ground plane. Vectorized: ``q`` of shape (n,4) returns shape (n,).
    """
    m = quat_to_matrix(q)
    single = m.ndim == 2
    m = m.reshape(-1, 3, 3)
    fwd = m[:, :, 2]  # camera z axis in world coords
    h = np.rad2deg(np.arctan2(fwd[:, 1], fwd[:, 0])) % 360.0
    return h[0] if single else h


def heading_diff_deg(a, b):
    """Absolute circular difference of two headings in degrees, in [0, 180].

    Vectorized over numpy arrays / pandas Series.
    """
    d = np.abs(np.asarray(a, dtype=np.float64) - np.asarray(b, dtype=np.float64)) % 360.0
    return np.where(d > 180.0, 360.0 - d, d)
