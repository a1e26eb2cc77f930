"""Unit tests for evaluation metrics, including an oracle check of the
Spark precision aggregation."""
import pandas as pd
import pytest

from repro.eval.metrics import (
    mean_scene_precision_at_k,
    precision_at_k,
    recall,
    spark_precision_at_k,
)
from repro.oracle import assert_equivalent


class TestPrecisionAtK:
    def test_basic(self):
        assert precision_at_k([1, 1, 0, 0], 4) == 0.5

    def test_truncates_to_k(self):
        assert precision_at_k([1, 1, 0, 0], 2) == 1.0

    def test_fewer_than_k_uses_max_available(self):
        # Paper: "we use the maximum number in these cases".
        assert precision_at_k([1, 0], 10) == 0.5

    def test_empty_is_none(self):
        assert precision_at_k([], 10) is None

    def test_bool_flags(self):
        assert precision_at_k([True, False], 2) == 0.5


class TestMeanScenePrecision:
    def _ranked(self):
        return pd.DataFrame(
            {
                "scene_id": ["a"] * 3 + ["b"] * 2,
                "rank": [1, 2, 3, 1, 2],
                "is_error": [True, True, False, False, True],
            }
        )

    def test_average_over_scenes(self):
        got = mean_scene_precision_at_k(self._ranked(), 10)
        assert got == pytest.approx((2 / 3 + 1 / 2) / 2)

    def test_k_truncation_per_scene(self):
        got = mean_scene_precision_at_k(self._ranked(), 1)
        assert got == pytest.approx((1.0 + 0.0) / 2)

    def test_scene_subset(self):
        got = mean_scene_precision_at_k(self._ranked(), 10, scenes=["a"])
        assert got == pytest.approx(2 / 3)

    def test_missing_scene_skipped(self):
        got = mean_scene_precision_at_k(self._ranked(), 10, scenes=["a", "zzz"])
        assert got == pytest.approx(2 / 3)

    def test_empty_none(self):
        got = mean_scene_precision_at_k(self._ranked().iloc[0:0], 10)
        assert got is None


class TestSparkPrecision:
    def test_matches_pandas(self, spark):
        pdf = pd.DataFrame(
            {
                "scene_id": ["a"] * 12 + ["b"] * 8,
                "rank": list(range(1, 13)) + list(range(1, 9)),
                "is_error": [i % 3 == 0 for i in range(12)] + [i % 2 == 0 for i in range(8)],
            }
        )
        got = spark_precision_at_k(spark.createDataFrame(pdf), 10)
        assert_equivalent(
            got,
            """
            SELECT scene_id,
                   sum(CASE WHEN is_error THEN 1.0 ELSE 0 END) / count(*) AS precision
            FROM r WHERE rank <= 10 GROUP BY scene_id
            """,
            r=pdf,
        )


class TestRecall:
    def test_basic(self):
        assert recall({1, 2}, {1, 2, 3, 4}) == 0.5

    def test_extraneous_found_ignored(self):
        assert recall({1, 2, 99}, {1, 2}) == 1.0

    def test_empty_truth_none(self):
        assert recall({1}, set()) is None
