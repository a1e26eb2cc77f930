"""Unit tests for the LIDAR-detector simulator."""
import numpy as np
import pandas as pd
import pytest

from repro.core.schema import ERR_GHOST, ERR_NONE, ERR_SUBTLE
from repro.perception.detector import DetectorConfig, generate_predictions
from repro.perception.world import WorldConfig, generate_world

WCFG = WorldConfig(n_scenes=3, duration_s=8.0, hz=5.0, objects_range=(12, 16), seed=21)
WORLD = generate_world(WCFG)


def preds(**kw):
    return generate_predictions(WORLD, WCFG, DetectorConfig(**kw))


class TestCleanPredictions:
    def test_deterministic(self):
        a = preds(seed=1)
        b = preds(seed=1)
        pd.testing.assert_frame_equal(a, b)

    def test_track_detection_rate(self):
        p = preds(p_track_detect=0.5, ghosts_range=(0, 0), subtle_range=(0, 0), seed=2)
        n_detected = p.groupby(["scene_id", "gt_track_id"]).ngroups
        n_total = WORLD.groupby(["scene_id", "gt_track_id"]).ngroups
        assert 0.3 < n_detected / n_total < 0.7

    def test_detect_all_when_p_one(self):
        p = preds(
            p_track_detect=1.0, p_frame_miss=0.0,
            ghosts_range=(0, 0), subtle_range=(0, 0), seed=3,
        )
        assert p.groupby(["scene_id", "gt_track_id"]).ngroups == WORLD.groupby(
            ["scene_id", "gt_track_id"]
        ).ngroups
        assert len(p) == len(WORLD)

    def test_frame_miss_thins_tracks(self):
        full = preds(p_track_detect=1.0, p_frame_miss=0.0, ghosts_range=(0, 0),
                     subtle_range=(0, 0), seed=4)
        thin = preds(p_track_detect=1.0, p_frame_miss=0.3, ghosts_range=(0, 0),
                     subtle_range=(0, 0), seed=4)
        assert len(thin) < len(full)

    def test_confidence_clipped(self):
        p = preds(conf=(0.9, 0.5), seed=5)
        assert p["confidence"].between(0.02, 0.99).all()

    def test_source_is_model(self):
        assert (preds(seed=6)["source"] == "model").all()


class TestGhosts:
    def test_ghost_count_in_range(self):
        p = preds(ghosts_range=(3, 5), subtle_range=(0, 0), seed=7)
        ghosts = p[p["err_type"] == ERR_GHOST]
        per_scene = ghosts.groupby("scene_id")["gt_track_id"].nunique()
        assert per_scene.between(3, 5).all()

    def test_ghost_ids_unique_negative(self):
        p = preds(ghosts_range=(4, 6), seed=8)
        ghosts = p[p["err_type"] == ERR_GHOST]
        assert (ghosts["gt_track_id"] < 0).all()
        # Unique per ghost: id count equals distinct (scene, id) pairs.
        assert (
            ghosts.groupby("gt_track_id")["scene_id"].nunique() == 1
        ).all()

    def test_no_ghosts_when_range_zero(self):
        p = preds(ghosts_range=(0, 0), seed=9)
        assert (p["err_type"] != ERR_GHOST).all()

    def test_ghost_confidence_range(self):
        # Per-ghost base in [0.2, 0.4] plus small per-frame noise.
        p = preds(ghosts_range=(3, 5), ghost_conf=(0.2, 0.4), seed=10)
        g = p[p["err_type"] == ERR_GHOST]
        assert g["confidence"].between(0.2 - 0.15, 0.4 + 0.15).all()
        # Per-track consistency: within-ghost spread is the small noise.
        assert (g.groupby("gt_track_id")["confidence"].std().dropna() < 0.1).all()

    def test_ghost_lifespan_short(self):
        p = preds(ghosts_range=(5, 8), seed=11)
        spans = p[p["err_type"] == ERR_GHOST].groupby("gt_track_id")["frame_id"].size()
        assert spans.between(3, 9).all()


class TestSubtleErrors:
    def test_subtle_conf_range(self):
        p = preds(subtle_range=(2, 3), subtle_conf=(0.85, 0.95), seed=12)
        s = p[p["err_type"] == ERR_SUBTLE]
        assert not s.empty
        assert s["confidence"].between(0.85, 0.95).all()

    def test_subtle_tracks_have_no_frame_gaps_vs_detection(self):
        # Subtle corruption must not change which frames are present
        # (no flicker/appear trigger) — only boxes/class/confidence.
        with_sub = preds(p_frame_miss=0.0, subtle_range=(2, 3), ghosts_range=(0, 0), seed=13)
        s = with_sub[with_sub["err_type"] == ERR_SUBTLE]
        for (sc, tid), grp in s.groupby(["scene_id", "gt_track_id"]):
            f = np.sort(grp["frame_id"].to_numpy())
            assert np.array_equal(f, np.arange(f[0], f[0] + len(f)))

    def test_subtle_only_on_long_tracks(self):
        p = preds(subtle_range=(2, 3), seed=14)
        spans = p[p["err_type"] == ERR_SUBTLE].groupby(
            ["scene_id", "gt_track_id"]
        )["frame_id"].size()
        assert (spans >= 8).all()

    def test_classification_flips_exist(self):
        # Half the subtle errors flip class: some subtle rows disagree
        # with the ground-truth class of their object.
        p = preds(subtle_range=(3, 4), ghosts_range=(0, 0), seed=15)
        s = p[p["err_type"] == ERR_SUBTLE].merge(
            WORLD[["scene_id", "gt_track_id", "frame_id", "cls"]],
            on=["scene_id", "gt_track_id", "frame_id"],
            suffixes=("", "_gt"),
        )
        assert (s["cls"] != s["cls_gt"]).any()

    def test_none_when_range_zero(self):
        p = preds(subtle_range=(0, 0), seed=16)
        assert (p["err_type"] != ERR_SUBTLE).all()


class TestTaxonomy:
    def test_err_types_partition(self):
        p = preds(seed=17)
        assert set(p["err_type"].unique()) <= {ERR_NONE, ERR_GHOST, ERR_SUBTLE}

    def test_clean_rows_match_gt_geometry(self):
        p = preds(p_track_detect=1.0, p_frame_miss=0.0, ghosts_range=(0, 0),
                  subtle_range=(0, 0), jitter_pos_sd=0.1, seed=18)
        merged = p.merge(
            WORLD, on=["scene_id", "gt_track_id", "frame_id"], suffixes=("", "_gt")
        )
        assert (merged["cx"] - merged["cx_gt"]).abs().max() < 2.0
