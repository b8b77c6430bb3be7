"""Unit tests for repro.geo.quaternion."""
import numpy as np
import pytest

from repro.geo.quaternion import (
    camera_quat_to_heading,
    heading_diff_deg,
    heading_to_camera_quat,
    matrix_to_quat,
    quat_to_matrix,
)

IDENTITY_Q = np.array([1.0, 0.0, 0.0, 0.0])


def test_identity_quaternion_gives_identity_matrix():
    np.testing.assert_allclose(quat_to_matrix(IDENTITY_Q), np.eye(3), atol=1e-12)


def test_quat_to_matrix_batch_shape():
    q = np.tile(IDENTITY_Q, (5, 1))
    m = quat_to_matrix(q)
    assert m.shape == (5, 3, 3)


def test_quat_to_matrix_is_rotation():
    rng = np.random.default_rng(0)
    q = rng.normal(size=(50, 4))
    m = quat_to_matrix(q)
    # Orthonormal with determinant +1.
    ident = np.einsum("nij,nkj->nik", m, m)
    np.testing.assert_allclose(ident, np.broadcast_to(np.eye(3), (50, 3, 3)), atol=1e-10)
    np.testing.assert_allclose(np.linalg.det(m), 1.0, atol=1e-10)


def test_quat_to_matrix_rejects_zero_norm():
    with pytest.raises(ValueError):
        quat_to_matrix(np.zeros(4))


@pytest.mark.parametrize("axis,angle", [(0, 0.3), (1, -1.2), (2, 2.0)])
def test_matrix_quat_roundtrip(axis, angle):
    v = np.zeros(3)
    v[axis] = 1.0
    q = np.concatenate([[np.cos(angle / 2)], np.sin(angle / 2) * v])
    m = quat_to_matrix(q)
    q2 = matrix_to_quat(m)
    np.testing.assert_allclose(quat_to_matrix(q2), m, atol=1e-10)


def test_matrix_to_quat_roundtrip_random():
    rng = np.random.default_rng(1)
    for q in rng.normal(size=(30, 4)):
        q = q / np.linalg.norm(q)
        m = quat_to_matrix(q)
        np.testing.assert_allclose(quat_to_matrix(matrix_to_quat(m)), m, atol=1e-9)


@pytest.mark.parametrize("heading", [0.0, 45.0, 90.0, 181.0, 270.0, 359.0])
def test_heading_roundtrip(heading):
    q = heading_to_camera_quat(heading)
    assert abs(camera_quat_to_heading(q) - heading) < 1e-6


def test_heading_zero_camera_axes():
    # Camera looking east: forward=(1,0,0), right=(0,-1,0), down=(0,0,-1).
    m = quat_to_matrix(heading_to_camera_quat(0.0))
    np.testing.assert_allclose(m[:, 2], [1, 0, 0], atol=1e-12)  # z fwd
    np.testing.assert_allclose(m[:, 0], [0, -1, 0], atol=1e-12)  # x right
    np.testing.assert_allclose(m[:, 1], [0, 0, -1], atol=1e-12)  # y down


def test_heading_north_camera_axes():
    m = quat_to_matrix(heading_to_camera_quat(90.0))
    np.testing.assert_allclose(m[:, 2], [0, 1, 0], atol=1e-12)
    np.testing.assert_allclose(m[:, 0], [1, 0, 0], atol=1e-12)


def test_pitch_90_looks_down():
    m = quat_to_matrix(heading_to_camera_quat(0.0, pitch_deg=90.0))
    np.testing.assert_allclose(m[:, 2], [0, 0, -1], atol=1e-12)


def test_camera_quat_to_heading_vectorized():
    qs = np.stack([heading_to_camera_quat(h) for h in (10.0, 200.0)])
    np.testing.assert_allclose(camera_quat_to_heading(qs), [10.0, 200.0], atol=1e-6)


@pytest.mark.parametrize(
    "a,b,expected",
    [(0, 0, 0), (0, 180, 180), (350, 10, 20), (10, 350, 20), (90, 270, 180), (0, 90, 90)],
)
def test_heading_diff(a, b, expected):
    assert heading_diff_deg(a, b) == pytest.approx(expected)


def test_heading_diff_vectorized():
    np.testing.assert_allclose(
        heading_diff_deg(np.array([0.0, 359.0]), np.array([90.0, 1.0])), [90.0, 2.0]
    )
