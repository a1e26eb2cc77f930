"""Cross-frame association of bundles into tracks (paper §4.2).

A *track* is an indexed sequence of observation bundles — the same
object followed through time. The paper associates "observations within
a track by box overlap across time" (§8.2). We implement the standard
greedy IOU tracker used throughout the MOT literature, with a
constant-velocity motion model: per frame each active track's box is
predicted forward by its estimated velocity, candidate (active-track,
bundle) pairs are matched greedily in descending IOU against the
predictions, unmatched bundles open new tracks, and tracks expire after
``max_gap`` unseen frames. (Without motion compensation, an object
moving more than its own length per frame has zero adjacent-frame IOU
and fragments into many single-frame tracks.)

Scenes are independent, so the tracker is a classic
partition-per-group dataflow: ``groupBy("scene_id").applyInPandas`` runs
the sequential per-scene tracker in parallel across scenes, and the
result joins back onto the observation DataFrame. The per-scene inner
loop is vectorized numpy over the frame's IOU matrix.

Track ids are strings ``"<scene_id>#<k>"`` — unique across the dataset
and deterministic (frames visited in order, bundles in id order).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.association.iou import BOX_COLS, iou_matrix
from repro.core.schema import SOURCE_MODEL

#: Default IOU for linking across adjacent frames. Lower than the
#: within-frame 0.5: an object moves between frames, so self-overlap
#: across one step is smaller than cross-source overlap at one instant.
TRACK_IOU_THRESHOLD = 0.05

#: A track survives this many frames without a match before expiring.
DEFAULT_MAX_GAP = 3

#: Metres added to each box extent during matching ("buffered IOU").
#: Small boxes moving a large fraction of their own size per frame have
#: near-zero raw IOU before a velocity estimate exists; dilating both
#: boxes keeps the first link findable without affecting well-separated
#: objects.
MATCH_BUFFER_M = 0.8


def _representative_boxes(pdf: pd.DataFrame) -> pd.DataFrame:
    """One representative box per (frame, bundle): prefer the model box
    (present for every bundle Fixy scores), else the human box."""
    pdf = pdf.copy()
    pdf["_pref"] = (pdf["source"] != SOURCE_MODEL).astype(int)
    pdf = pdf.sort_values(["frame_id", "bundle_id", "_pref", "obs_id"])
    return pdf.drop_duplicates(subset=["frame_id", "bundle_id"], keep="first")


def _track_scene(pdf: pd.DataFrame, iou_threshold: float, max_gap: int) -> pd.DataFrame:
    scene_id = pdf["scene_id"].iloc[0]
    reps = _representative_boxes(pdf)
    out_bundle, out_track = [], []
    # Active tracks: parallel lists of last box, per-frame velocity
    # (constant-velocity motion model — without it a fast object that
    # moves more than its own length per frame has zero adjacent-frame
    # IOU and fragments into many tracks), last frame, track index.
    act_boxes: list[np.ndarray] = []
    act_vel: list[np.ndarray] = []
    act_frame: list[int] = []
    act_tid: list[int] = []
    next_tid = 0
    for frame_id, grp in reps.groupby("frame_id", sort=True):
        # Expire stale tracks BEFORE matching: a track unseen for more
        # than max_gap frames must not capture this frame's bundles.
        keep = [k for k, f in enumerate(act_frame) if frame_id - f <= max_gap]
        act_boxes = [act_boxes[k] for k in keep]
        act_vel = [act_vel[k] for k in keep]
        act_frame = [act_frame[k] for k in keep]
        act_tid = [act_tid[k] for k in keep]
        grp = grp.sort_values("bundle_id")
        boxes = grp[list(BOX_COLS)].to_numpy(dtype=np.float64)
        assigned = np.full(len(grp), -1, dtype=np.int64)
        if act_boxes:
            # Predict each active track's box forward to this frame.
            pred = np.stack(act_boxes).copy()
            for i in range(pred.shape[0]):
                gap = int(frame_id) - act_frame[i]
                pred[i, 0:2] += act_vel[i] * gap
            # Match on buffered boxes (extents dilated by MATCH_BUFFER_M).
            pred_b = pred.copy()
            pred_b[:, 3:6] += MATCH_BUFFER_M
            boxes_b = boxes.copy()
            boxes_b[:, 3:6] += MATCH_BUFFER_M
            m = iou_matrix(pred_b, boxes_b)
            # Greedy: repeatedly take the best remaining pair.
            while True:
                i, j = np.unravel_index(np.argmax(m), m.shape)
                if m[i, j] <= iou_threshold:
                    break
                assigned[j] = i
                m[i, :] = -1.0
                m[:, j] = -1.0
        for j, bundle_id in enumerate(grp["bundle_id"].to_numpy()):
            if assigned[j] >= 0:
                i = int(assigned[j])
                gap = int(frame_id) - act_frame[i]
                act_vel[i] = (boxes[j, 0:2] - act_boxes[i][0:2]) / max(gap, 1)
                act_boxes[i] = boxes[j]
                act_frame[i] = int(frame_id)
                tid = act_tid[i]
            else:
                tid = next_tid
                next_tid += 1
                act_boxes.append(boxes[j])
                act_vel.append(np.zeros(2))
                act_frame.append(int(frame_id))
                act_tid.append(tid)
            out_bundle.append(int(bundle_id))
            out_track.append(tid)
    return pd.DataFrame(
        {
            "scene_id": scene_id,
            "bundle_id": np.asarray(out_bundle, dtype=np.int64),
            "track_id": [f"{scene_id}#{t}" for t in out_track],
        }
    )


def assign_tracks(
    obs_with_bundles: DataFrame,
    iou_threshold: float = TRACK_IOU_THRESHOLD,
    max_gap: int = DEFAULT_MAX_GAP,
) -> DataFrame:
    """Attach a ``track_id`` column by linking bundles across frames.

    Args:
        obs_with_bundles: observations carrying a ``bundle_id`` column
            (from :func:`repro.association.bundler.assign_bundles`).
        iou_threshold: minimum adjacent-frame IOU to link.
        max_gap: frames a track may go unseen before expiring.

    Returns:
        the input with one extra ``track_id`` string column.
    """
    if "bundle_id" not in obs_with_bundles.columns:
        raise ValueError("assign_tracks requires a bundle_id column; run assign_bundles first")
    cols = ["scene_id", "frame_id", "bundle_id", "obs_id", "source", *BOX_COLS]
    reps_in = obs_with_bundles.select(*cols)
    mapping = reps_in.groupBy("scene_id").applyInPandas(
        lambda pdf: _track_scene(pdf, iou_threshold, max_gap),
        schema="scene_id string, bundle_id long, track_id string",
    )
    return obs_with_bundles.join(mapping, on=["scene_id", "bundle_id"], how="left")
