"""Unit tests for harness internals: truth attachment and dedup."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.eval.harness import _dedupe_errors


class TestDedupeErrors:
    def _pdf(self, rows):
        return pd.DataFrame(rows, columns=["scene_id", "rank", "maj_gt", "is_error"])

    def test_first_flag_kept_repeats_demoted(self):
        pdf = self._pdf([
            ("s", 1, 7, True),
            ("s", 2, 7, True),   # duplicate report of object 7
            ("s", 3, 8, True),
        ])
        got = _dedupe_errors(pdf)
        assert list(got["is_error"]) == [True, False, True]

    def test_dedupe_is_rank_ordered_not_row_ordered(self):
        pdf = self._pdf([
            ("s", 2, 7, True),
            ("s", 1, 7, True),
        ])
        got = _dedupe_errors(pdf).sort_values("rank")
        assert list(got["is_error"]) == [True, False]

    def test_scenes_independent(self):
        pdf = self._pdf([
            ("a", 1, 7, True),
            ("b", 1, 7, True),  # same gt id, different scene: both count
        ])
        got = _dedupe_errors(pdf)
        assert got["is_error"].all()

    def test_non_errors_untouched(self):
        pdf = self._pdf([
            ("s", 1, -3, False),
            ("s", 2, -3, False),
        ])
        got = _dedupe_errors(pdf)
        assert not got["is_error"].any()


class TestTrackTruth:
    @pytest.fixture(scope="class")
    def prep(self, spark):
        from repro.eval import harness

        return harness.prepare(spark, "internal", 0.16)

    def test_majority_and_missing_flags(self, spark, prep):
        from repro.eval import harness

        truth = harness._track_truth(prep, spark).toPandas()
        assert {"scene_id", "track_id", "maj_gt", "maj_cls", "err_frac", "is_missing"} <= set(truth.columns)
        # Every injected missing track that the model detected appears
        # flagged somewhere.
        man = prep.ds.manifest.missing_tracks
        flagged = set(truth.loc[truth["is_missing"], "maj_gt"])
        injected = set(man["gt_track_id"])
        assert flagged <= injected
        assert len(flagged) > 0

    def test_ghost_tracks_never_missing(self, spark, prep):
        from repro.eval import harness

        truth = harness._track_truth(prep, spark).toPandas()
        ghosts = truth[truth["maj_gt"] < 0]
        assert not ghosts["is_missing"].any()

    def test_err_frac_bounds(self, spark, prep):
        from repro.eval import harness

        truth = harness._track_truth(prep, spark).toPandas()
        assert truth["err_frac"].between(0, 1).all()
