"""Unit tests for the user-facing LOA DSL (paper §3's worked example)."""
import math

import numpy as np
import pytest

from repro.core.dsl import (
    Box,
    Bundle,
    Bundler,
    KDEObsDistribution,
    Observation,
    Scene,
    Track,
    aof_identity,
    aof_invert,
    aof_zero_if,
    compile_scene,
    compute_iou,
)
from repro.core.kde import EPS


# The paper's §3 worked-example snippets, verbatim in structure:
class TrackBundler(Bundler):
    def is_associated(self, box1, box2):
        return compute_iou(box1, box2) > 0.5


class VolumeDistribution(KDEObsDistribution):
    name = "volume"

    def feature(self, box):
        vol = box.width * box.height * box.length
        return vol


def obs(i, vol_side=1.0, cx=0.0):
    return Observation(
        obs_id=i, source="model", cls="car",
        box=Box(cx=cx, length=vol_side, width=vol_side, height=vol_side),
    )


def fitted_volume_dist(vols, seed=0):
    rng = np.random.default_rng(seed)
    train = [obs(i, vol_side=float(v) ** (1 / 3)) for i, v in enumerate(vols)]
    return VolumeDistribution().fit(train)


class TestPaperSnippets:
    def test_compute_iou_matches_numpy(self):
        assert compute_iou(Box(), Box()) == pytest.approx(1.0)
        assert compute_iou(Box(), Box(cx=100)) == 0.0

    def test_track_bundler_associates_overlapping(self):
        b = TrackBundler()
        assert b.is_associated(Box(), Box(cx=0.1, length=1.0), )

    def test_track_bundler_rejects_disjoint(self):
        assert not TrackBundler().is_associated(Box(), Box(cx=10))

    def test_default_bundler_threshold(self):
        # IOU(shift half length) = 1/3 < 0.5 → not associated.
        assert not Bundler().is_associated(
            Box(length=4, width=2, height=1.5), Box(cx=2, length=4, width=2, height=1.5)
        )

    def test_volume_distribution_learns(self):
        rng = np.random.default_rng(1)
        dist = fitted_volume_dist(rng.normal(8.0, 0.5, 200))
        typical = obs(0, vol_side=2.0)  # vol 8
        weird = obs(1, vol_side=4.0)  # vol 64
        assert dist.likelihood(typical) > 0.5
        assert dist.likelihood(weird) < 1e-3


class TestAofs:
    def test_identity(self):
        assert aof_identity(0.3) == 0.3

    def test_invert(self):
        assert aof_invert(0.3) == pytest.approx(0.7)
        assert aof_invert(1.0) == EPS

    def test_zero_if(self):
        f = aof_zero_if(lambda x: x < 0.5)
        assert f(0.3) == 0.0
        assert f(0.7) == 0.7


class TestCompileScene:
    def _scene(self, vols):
        tracks = [
            Track(bundles=[Bundle(observations=[obs(i, vol_side=v ** (1 / 3))])])
            for i, v in enumerate(vols)
        ]
        return Scene(tracks=tracks)

    def test_nodes_and_factors(self):
        rng = np.random.default_rng(2)
        dist = fitted_volume_dist(rng.normal(8, 0.5, 100))
        scene = self._scene([8.0, 8.0, 64.0])
        g = compile_scene(scene, [dist])
        assert len(g.observations) == 3
        assert len(g.factors) == 3  # one per (distribution, observation)

    def test_scoring_ranks_unlikely_last(self):
        rng = np.random.default_rng(3)
        dist = fitted_volume_dist(rng.normal(8, 0.5, 100))
        scene = self._scene([8.0, 64.0])
        g = compile_scene(scene, [dist])
        ranked = g.rank({"typical": [0], "weird": [1]})
        assert [name for name, _ in ranked] == ["typical", "weird"]

    def test_invert_aof_flips_ranking(self):
        rng = np.random.default_rng(4)
        dist = fitted_volume_dist(rng.normal(8, 0.5, 100))
        scene = self._scene([8.0, 64.0])
        g = compile_scene(scene, [dist], aof=aof_invert)
        ranked = g.rank({"typical": [0], "weird": [1]})
        assert [name for name, _ in ranked] == ["weird", "typical"]

    def test_scene_obs_ids(self):
        scene = self._scene([8.0, 8.0])
        assert scene.obs_ids() == (0, 1)
        assert scene.tracks[0].obs_ids() == (0,)
