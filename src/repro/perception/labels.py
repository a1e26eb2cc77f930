"""Human-label vendor simulator with the paper's error taxonomy.

The paper's central observation is that "vendors can often provide
erroneous labels" (§1); the most egregious errors are "when objects are
entirely missed in labeling" (§2). This module derives vendor labels
from the ground-truth world and *injects exactly those errors*,
returning an exact manifest of what was injected — the simulation
analogue of the paper's expert auditors.

Error taxonomy (paper → here):

- missing tracks (§8.2): a whole object never labeled —
  ``p_missing_track`` per object, optionally forced to an exact count
  per scene (for the audited internal scene with 24 missing tracks).
- missing observations within tracks (§8.3): a single frame dropped
  from an otherwise-labeled track — ``n_missing_obs`` injections.
- box jitter: benign labeling noise on positions/dimensions.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.core.schema import ERR_NONE, SOURCE_HUMAN


@dataclass(frozen=True)
class LabelNoiseConfig:
    """Vendor noise model.

    Attributes:
        p_missing_track: probability an object is entirely missed.
        forced_missing: ``{scene_id: k}`` — force exactly ``k`` missing
            tracks in the given scene (used for the audited scene).
        n_missing_obs: how many single-frame drops to inject across the
            dataset (the paper found exactly one such case, §8.3).
        jitter_pos_sd / jitter_dim_sd: labeling noise, metres.
        seed: numpy seed.
    """

    p_missing_track: float = 0.1
    forced_missing: dict[str, int] = field(default_factory=dict)
    n_missing_obs: int = 0
    jitter_pos_sd: float = 0.06
    jitter_dim_sd: float = 0.03
    seed: int = 100


@dataclass
class LabelManifest:
    """Exact record of injected label errors (evaluation ground truth).

    Attributes:
        missing_tracks: per injected missing track: scene_id,
            gt_track_id, cls, n_frames.
        missing_obs: per injected single-frame drop: scene_id,
            gt_track_id, frame_id.
    """

    missing_tracks: pd.DataFrame
    missing_obs: pd.DataFrame


def generate_labels(
    gt: pd.DataFrame, cfg: LabelNoiseConfig
) -> tuple[pd.DataFrame, LabelManifest]:
    """Produce vendor labels for ground truth ``gt``.

    Returns:
        ``(labels, manifest)`` — labels carry the canonical observation
        columns except ``obs_id`` (assigned by the dataset builder);
        ``source="human"``, ``confidence=1.0``.
    """
    rng = np.random.default_rng(cfg.seed)
    tracks = (
        gt.groupby(["scene_id", "gt_track_id"])
        .agg(cls=("cls", "first"), n_frames=("frame_id", "size"))
        .reset_index()
    )
    # --- whole missing tracks ---------------------------------------
    missing_rows = []
    for scene_id, grp in tracks.groupby("scene_id", sort=True):
        ids = grp["gt_track_id"].to_numpy()
        if scene_id in cfg.forced_missing:
            # Stratify the forced-missing picks across classes (the
            # paper's audited scene surfaced missing tracks of every
            # class — §8.2 reports recall "per-class"): round-robin one
            # object per class until k are chosen.
            k = min(cfg.forced_missing[scene_id], ids.size)
            by_cls = {
                c: list(rng.permutation(g["gt_track_id"].to_numpy()))
                for c, g in grp.groupby("cls")
            }
            chosen = []
            order = sorted(by_cls)
            while len(chosen) < k:
                for c in order:
                    if by_cls[c] and len(chosen) < k:
                        chosen.append(by_cls[c].pop())
            chosen = np.asarray(chosen)
        else:
            chosen = ids[rng.random(ids.size) < cfg.p_missing_track]
        missing_rows.append(grp[grp["gt_track_id"].isin(chosen)])
    missing_tracks = (
        pd.concat(missing_rows, ignore_index=True)
        if missing_rows
        else tracks.iloc[0:0]
    )
    missing_set = set(zip(missing_tracks["scene_id"], missing_tracks["gt_track_id"]))
    keyed = list(zip(gt["scene_id"], gt["gt_track_id"]))
    labels = gt[[k not in missing_set for k in keyed]].copy()

    # --- single missing observations within surviving tracks --------
    surv = (
        labels.groupby(["scene_id", "gt_track_id"])
        .agg(n=("frame_id", "size"))
        .reset_index()
    )
    candidates = surv[surv["n"] >= 6].sort_values(["scene_id", "gt_track_id"])
    n_inject = min(cfg.n_missing_obs, len(candidates))
    dropped = []
    if n_inject > 0:
        picked = candidates.iloc[
            rng.choice(len(candidates), size=n_inject, replace=False)
        ]
        for _, row in picked.iterrows():
            mask = (labels["scene_id"] == row["scene_id"]) & (
                labels["gt_track_id"] == row["gt_track_id"]
            )
            frames = np.sort(labels.loc[mask, "frame_id"].unique())
            # Drop a middle frame so the track clearly continues around it.
            victim = int(frames[len(frames) // 2])
            labels = labels[~(mask & (labels["frame_id"] == victim))]
            dropped.append(
                {
                    "scene_id": row["scene_id"],
                    "gt_track_id": row["gt_track_id"],
                    "frame_id": victim,
                }
            )
    missing_obs = pd.DataFrame(dropped, columns=["scene_id", "gt_track_id", "frame_id"])

    # --- benign labeling jitter --------------------------------------
    # Localization error scales with object size (annotators and
    # detectors are relatively, not absolutely, accurate) — without
    # this, small boxes (pedestrians) would systematically fail the
    # IOU-0.5 association that the paper's bundler assumes works.
    n = len(labels)
    size_scale = np.clip(labels["length"].to_numpy() / 4.5, 0.25, 2.0)
    labels["cx"] = labels["cx"] + rng.normal(0, cfg.jitter_pos_sd, n) * size_scale
    labels["cy"] = labels["cy"] + rng.normal(0, cfg.jitter_pos_sd, n) * size_scale
    labels["cz"] = labels["cz"] + rng.normal(0, cfg.jitter_pos_sd / 2, n) * size_scale
    for dim in ("length", "width", "height"):
        labels[dim] = np.maximum(
            labels[dim] + rng.normal(0, cfg.jitter_dim_sd, n) * size_scale, 0.05
        )
    labels["source"] = SOURCE_HUMAN
    labels["confidence"] = 1.0
    labels["err_type"] = ERR_NONE
    return labels.reset_index(drop=True), LabelManifest(
        missing_tracks.reset_index(drop=True), missing_obs
    )
