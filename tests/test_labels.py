"""Unit tests for the human-label vendor simulator."""
import numpy as np
import pandas as pd
import pytest

from repro.perception.labels import LabelNoiseConfig, generate_labels
from repro.perception.world import WorldConfig, generate_world

WORLD = generate_world(
    WorldConfig(n_scenes=3, duration_s=8.0, hz=5.0, objects_range=(10, 14), seed=1)
)


class TestMissingTracks:
    def test_missing_tracks_absent_from_labels(self):
        labels, man = generate_labels(WORLD, LabelNoiseConfig(p_missing_track=0.3, seed=2))
        gone = set(zip(man.missing_tracks["scene_id"], man.missing_tracks["gt_track_id"]))
        present = set(zip(labels["scene_id"], labels["gt_track_id"]))
        assert gone and not (gone & present)

    def test_non_missing_tracks_fully_present(self):
        labels, man = generate_labels(
            WORLD, LabelNoiseConfig(p_missing_track=0.3, seed=2)
        )
        gone = set(zip(man.missing_tracks["scene_id"], man.missing_tracks["gt_track_id"]))
        for (sc, tid), grp in WORLD.groupby(["scene_id", "gt_track_id"]):
            if (sc, tid) not in gone:
                got = labels[(labels["scene_id"] == sc) & (labels["gt_track_id"] == tid)]
                assert len(got) == len(grp)

    def test_zero_rate_drops_nothing(self):
        labels, man = generate_labels(WORLD, LabelNoiseConfig(p_missing_track=0.0, seed=3))
        assert man.missing_tracks.empty
        assert len(labels) == len(WORLD)

    def test_forced_missing_exact_count(self):
        cfg = LabelNoiseConfig(
            p_missing_track=0.0, forced_missing={"scene-0001": 5}, seed=4
        )
        _, man = generate_labels(WORLD, cfg)
        assert len(man.missing_tracks) == 5
        assert (man.missing_tracks["scene_id"] == "scene-0001").all()

    def test_forced_missing_capped_at_population(self):
        cfg = LabelNoiseConfig(
            p_missing_track=0.0, forced_missing={"scene-0000": 10_000}, seed=5
        )
        _, man = generate_labels(WORLD, cfg)
        n_obj = WORLD[WORLD["scene_id"] == "scene-0000"]["gt_track_id"].nunique()
        assert len(man.missing_tracks) == n_obj

    def test_manifest_carries_class_and_length(self):
        _, man = generate_labels(WORLD, LabelNoiseConfig(p_missing_track=0.5, seed=6))
        assert {"scene_id", "gt_track_id", "cls", "n_frames"} <= set(
            man.missing_tracks.columns
        )
        assert (man.missing_tracks["n_frames"] > 0).all()

    def test_deterministic(self):
        cfg = LabelNoiseConfig(p_missing_track=0.3, seed=7)
        a, ma = generate_labels(WORLD, cfg)
        b, mb = generate_labels(WORLD, cfg)
        pd.testing.assert_frame_equal(a, b)
        pd.testing.assert_frame_equal(ma.missing_tracks, mb.missing_tracks)


class TestMissingObs:
    def test_injection_drops_exactly_one_frame(self):
        cfg = LabelNoiseConfig(p_missing_track=0.0, n_missing_obs=2, seed=8)
        labels, man = generate_labels(WORLD, cfg)
        assert len(man.missing_obs) == 2
        for _, row in man.missing_obs.iterrows():
            grp = labels[
                (labels["scene_id"] == row["scene_id"])
                & (labels["gt_track_id"] == row["gt_track_id"])
            ]
            gt_grp = WORLD[
                (WORLD["scene_id"] == row["scene_id"])
                & (WORLD["gt_track_id"] == row["gt_track_id"])
            ]
            assert len(grp) == len(gt_grp) - 1
            assert row["frame_id"] not in set(grp["frame_id"])

    def test_dropped_frame_is_interior(self):
        cfg = LabelNoiseConfig(p_missing_track=0.0, n_missing_obs=3, seed=9)
        labels, man = generate_labels(WORLD, cfg)
        for _, row in man.missing_obs.iterrows():
            grp = labels[
                (labels["scene_id"] == row["scene_id"])
                & (labels["gt_track_id"] == row["gt_track_id"])
            ]
            assert grp["frame_id"].min() < row["frame_id"] < grp["frame_id"].max()

    def test_no_injection_by_default(self):
        _, man = generate_labels(WORLD, LabelNoiseConfig(seed=10))
        assert man.missing_obs.empty


class TestJitter:
    def test_labels_jittered_but_close(self):
        cfg = LabelNoiseConfig(p_missing_track=0.0, jitter_pos_sd=0.05, seed=11)
        labels, _ = generate_labels(WORLD, cfg)
        merged = labels.merge(
            WORLD, on=["scene_id", "gt_track_id", "frame_id"], suffixes=("", "_gt")
        )
        dx = (merged["cx"] - merged["cx_gt"]).abs()
        assert dx.max() > 0  # actually jittered
        assert dx.max() < 1.0  # but bounded (size-scaled sigma)

    def test_source_and_confidence(self):
        labels, _ = generate_labels(WORLD, LabelNoiseConfig(seed=12))
        assert (labels["source"] == "human").all()
        assert (labels["confidence"] == 1.0).all()
        assert (labels["err_type"] == "none").all()

    def test_dimensions_stay_positive(self):
        cfg = LabelNoiseConfig(p_missing_track=0.0, jitter_dim_sd=2.0, seed=13)
        labels, _ = generate_labels(WORLD, cfg)
        for dim in ("length", "width", "height"):
            assert (labels[dim] > 0).all()
