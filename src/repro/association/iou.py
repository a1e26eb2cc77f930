"""3D intersection-over-union for axis-aligned boxes.

The paper associates observations "with high box overlap" via IOU
(§3's ``TrackBundler`` example uses ``compute_iou(box1, box2) > 0.5``).
We use axis-aligned 3D IOU: the synthetic world generates axis-aligned
boxes (yaw is folded into the length/width extents), so axis-aligned
overlap is exact for our data and keeps both the numpy and Spark
implementations simple and identical.

Two implementations, kept in lockstep by tests:

- :func:`iou_numpy` — vectorized numpy, used inside ``applyInPandas``
  trackers and unit tests.
- :func:`iou_expr` — a Spark ``Column`` expression over two prefixed
  box-column sets, used by the bundler's IOU join so association stays
  inside Catalyst.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

BOX_COLS = ("cx", "cy", "cz", "length", "width", "height")


def _overlap_np(c1, e1, c2, e2):
    lo = np.maximum(c1 - e1 / 2, c2 - e2 / 2)
    hi = np.minimum(c1 + e1 / 2, c2 + e2 / 2)
    return np.maximum(hi - lo, 0.0)


def iou_numpy(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """Elementwise 3D IOU between box arrays ``a`` and ``b``.

    Args:
        a, b: arrays of shape ``(n, 6)`` — columns ``cx, cy, cz,
            length, width, height`` (broadcastable shapes allowed).

    Returns:
        array of IOUs in ``[0, 1]``.
    """
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    ix = _overlap_np(a[..., 0], a[..., 3], b[..., 0], b[..., 3])
    iy = _overlap_np(a[..., 1], a[..., 4], b[..., 1], b[..., 4])
    iz = _overlap_np(a[..., 2], a[..., 5], b[..., 2], b[..., 5])
    inter = ix * iy * iz
    va = a[..., 3] * a[..., 4] * a[..., 5]
    vb = b[..., 3] * b[..., 4] * b[..., 5]
    union = va + vb - inter
    return np.where(union > 0, inter / np.where(union > 0, union, 1.0), 0.0)


def iou_matrix(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """All-pairs IOU matrix of shape ``(len(a), len(b))``."""
    a = np.asarray(a, dtype=np.float64)
    b = np.asarray(b, dtype=np.float64)
    return iou_numpy(a[:, None, :], b[None, :, :])


def _overlap_expr(c1: Column, e1: Column, c2: Column, e2: Column) -> Column:
    lo = F.greatest(c1 - e1 / 2, c2 - e2 / 2)
    hi = F.least(c1 + e1 / 2, c2 + e2 / 2)
    return F.greatest(hi - lo, F.lit(0.0))


def iou_expr(p1: str, p2: str) -> Column:
    """Spark column computing 3D IOU between two prefixed box column
    sets, e.g. ``iou_expr("h_", "m_")`` over columns ``h_cx .. m_height``.
    """

    def c(prefix: str, name: str) -> Column:
        return F.col(prefix + name)

    ix = _overlap_expr(c(p1, "cx"), c(p1, "length"), c(p2, "cx"), c(p2, "length"))
    iy = _overlap_expr(c(p1, "cy"), c(p1, "width"), c(p2, "cy"), c(p2, "width"))
    iz = _overlap_expr(c(p1, "cz"), c(p1, "height"), c(p2, "cz"), c(p2, "height"))
    inter = ix * iy * iz
    va = c(p1, "length") * c(p1, "width") * c(p1, "height")
    vb = c(p2, "length") * c(p2, "width") * c(p2, "height")
    union = va + vb - inter
    return F.when(union > 0, inter / union).otherwise(F.lit(0.0))
