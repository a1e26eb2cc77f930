"""Unit tests for 3D IOU — numpy and Spark implementations agree."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.association.iou import iou_expr, iou_matrix, iou_numpy


def box(cx=0, cy=0, cz=0, ln=4, w=2, h=1.5):
    return np.array([cx, cy, cz, ln, w, h], dtype=float)


class TestIouNumpy:
    def test_identical_boxes(self):
        assert iou_numpy(box(), box()) == pytest.approx(1.0)

    def test_disjoint_boxes(self):
        assert iou_numpy(box(), box(cx=100)) == 0.0

    def test_touching_boxes(self):
        # Edge contact: zero-volume intersection.
        assert iou_numpy(box(ln=4), box(cx=4, ln=4)) == 0.0

    def test_half_overlap_1d(self):
        # Shift by half the length: inter = 2*2*1.5, union = 2*12 - 6.
        got = iou_numpy(box(ln=4), box(cx=2, ln=4))
        assert got == pytest.approx(6.0 / 18.0)

    def test_contained_box(self):
        small = box(ln=1, w=1, h=1)
        big = box(ln=4, w=4, h=4)
        assert iou_numpy(small, big) == pytest.approx(1.0 / 64.0)

    @pytest.mark.parametrize("seed", range(5))
    def test_symmetry(self, seed):
        rng = np.random.default_rng(seed)
        a = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (10, 6))
        b = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (10, 6))
        np.testing.assert_allclose(iou_numpy(a, b), iou_numpy(b, a))

    @pytest.mark.parametrize("seed", range(5))
    def test_bounds(self, seed):
        rng = np.random.default_rng(100 + seed)
        a = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (50, 6))
        b = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (50, 6))
        got = iou_numpy(a, b)
        assert np.all(got >= 0) and np.all(got <= 1)

    def test_zero_volume_box(self):
        assert iou_numpy(box(ln=0, w=0, h=0), box()) == 0.0

    def test_matrix_shape_and_values(self):
        a = np.stack([box(), box(cx=10)])
        b = np.stack([box(), box(cx=2, ln=4), box(cx=10)])
        m = iou_matrix(a, b)
        assert m.shape == (2, 3)
        assert m[0, 0] == pytest.approx(1.0)
        assert m[0, 1] == pytest.approx(6.0 / 18.0)
        assert m[0, 2] == 0.0
        assert m[1, 2] == pytest.approx(1.0)


class TestIouExprMatchesNumpy:
    @pytest.mark.parametrize("seed", range(4))
    def test_random_pairs(self, spark, seed):
        rng = np.random.default_rng(200 + seed)
        n = 64
        a = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (n, 6))
        b = rng.uniform([-5, -5, 0, 0.5, 0.5, 0.5], [5, 5, 2, 6, 3, 3], (n, 6))
        cols = ["cx", "cy", "cz", "length", "width", "height"]
        pdf = pd.DataFrame(
            {**{"h_" + c: a[:, i] for i, c in enumerate(cols)},
             **{"m_" + c: b[:, i] for i, c in enumerate(cols)},
             "idx": np.arange(n)}
        )
        got = (
            spark.createDataFrame(pdf)
            .withColumn("iou", iou_expr("h_", "m_"))
            .orderBy("idx")
            .select("iou")
            .toPandas()["iou"]
            .to_numpy()
        )
        np.testing.assert_allclose(got, iou_numpy(a, b), atol=1e-12)

    def test_exact_known_value(self, spark):
        pdf = pd.DataFrame(
            [{"h_cx": 0.0, "h_cy": 0.0, "h_cz": 0.0, "h_length": 4.0,
              "h_width": 2.0, "h_height": 1.5, "m_cx": 2.0, "m_cy": 0.0,
              "m_cz": 0.0, "m_length": 4.0, "m_width": 2.0, "m_height": 1.5}]
        )
        got = (
            spark.createDataFrame(pdf).select(iou_expr("h_", "m_").alias("iou")).first()["iou"]
        )
        assert got == pytest.approx(6.0 / 18.0)
