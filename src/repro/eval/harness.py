"""End-to-end experiment drivers, one per table/result in §8.

Every driver runs the full Fixy dataflow — build dataset, learn
feature distributions from the training labels (offline phase,
§5), associate observations into bundles and tracks (§4), score with
the application's AOF (§6, §7), rank — plus the paper's baselines, and
returns a dict of the numbers the paper reports:

- :func:`run_missing_tracks` → Table 3 (precision@{10,5,1}, Fixy vs
  ad-hoc MA rand/conf) and the Lyft scene-level hit rate.
- :func:`run_recall` → §8.2 recall on the audited internal scene
  (paper: 18/24 = 75%).
- :func:`run_missing_obs` → §8.3 rank of the injected single missing
  observation (paper: ranked first).
- :func:`run_model_errors` → §8.4 precision@10 for novel model errors
  after excluding ad-hoc MA catches (paper: Fixy 82% vs uncertainty
  sampling 42%), and the highest confidence among found errors (paper:
  up to 95%).
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.association.bundler import assign_bundles, overlapping_model_obs
from repro.association.tracker import assign_tracks
from repro.baselines.model_assertions import (
    appear_flags,
    consistency_candidates,
    flicker_flags,
    multibox_flags,
)
from repro.baselines.uncertainty import rank_by_uncertainty
from repro.core.distributions import FeatureDistributions, learn_feature_distributions
from repro.core.features import (
    track_stats,
    with_distance,
    with_velocity,
    with_volume,
)
from repro.core.schema import ERR_NONE, SOURCE_MODEL
from repro.core.scoring import (
    rank_components,
    score_components,
    with_distance_logp,
    with_feature_logps,
)
from repro.eval.metrics import mean_scene_precision_at_k, precision_at_k
from repro.perception.datasets import (
    CONFIGS,
    INTERNAL_AUDIT_SCENE,
    Dataset,
    build_dataset,
)

#: Track-level *count* feature threshold (Table 2: "Filters tracks with
#: two or fewer obs.").
MIN_TRACK_OBS = 3


@dataclass
class Prepared:
    """A dataset taken through the offline phase and association."""

    ds: Dataset
    fd: FeatureDistributions
    tracked: DataFrame  # eval observations + bundle_id + track_id (cached)


def prepare(spark: SparkSession, name: str, scale: float = 1.0) -> Prepared:
    """Build dataset ``name``, learn feature distributions, associate."""
    ds = build_dataset(spark, CONFIGS[name](scale))
    fd = learn_feature_distributions(ds.train_labels)
    tracked = assign_tracks(assign_bundles(ds.eval_obs)).cache()
    tracked.count()  # materialize once; every experiment reuses it
    return Prepared(ds=ds, fd=fd, tracked=tracked)


# --------------------------------------------------------------------
# Shared: candidate truth labels from the injected-error manifest.
# --------------------------------------------------------------------


def _track_truth(prep: Prepared, spark: SparkSession) -> DataFrame:
    """Per-track evaluation labels: the majority ground-truth object the
    track follows, its error composition, and whether that object is an
    injected missing track."""
    model = prep.tracked.where(F.col("source") == SOURCE_MODEL)
    maj = model.groupBy("scene_id", "track_id").agg(
        F.mode("gt_track_id").alias("maj_gt"),
        F.mode("cls").alias("maj_cls"),
        F.avg((F.col("err_type") != ERR_NONE).cast("double")).alias("err_frac"),
    )
    mt = prep.ds.manifest.missing_tracks
    miss = spark.createDataFrame(
        mt[["scene_id", "gt_track_id"]], schema="scene_id string, gt_track_id long"
    ).withColumnRenamed("gt_track_id", "maj_gt")
    return maj.join(
        miss.withColumn("is_missing", F.lit(True)), ["scene_id", "maj_gt"], "left"
    ).fillna({"is_missing": False})


def _dedupe_errors(pdf: pd.DataFrame, rank_col: str = "rank") -> pd.DataFrame:
    """A missing object flagged twice (track fragments) counts once: the
    first-ranked flag stays a true positive, repeats become false
    positives — matching how an auditor would score duplicate reports."""
    pdf = pdf.sort_values(["scene_id", rank_col]).copy()
    seen: set[tuple] = set()
    flags = []
    for _, row in pdf.iterrows():
        ok = bool(row["is_error"])
        if ok:
            key = (row["scene_id"], row["maj_gt"])
            if key in seen:
                ok = False
            else:
                seen.add(key)
        flags.append(ok)
    pdf["is_error"] = flags
    return pdf


# --------------------------------------------------------------------
# §8.2 / Table 3 — finding missing tracks.
# --------------------------------------------------------------------


def fixy_missing_track_candidates(prep: Prepared) -> DataFrame:
    """The Fixy dataflow for the missing-track application (§7):

    features volume + velocity (learned) and distance (manual severity);
    AOF zeroes tracks containing any human proposal (implemented as a
    filter — ln 0 removes the component) and the *count* feature filters
    tracks with two or fewer observations; remaining model-only tracks
    are scored by mean ``ln p`` and ranked per scene, highest first
    ("consistent predictions from the model are likely to be correct").
    """
    obs = with_velocity(with_distance(with_volume(prep.tracked)))
    scored = with_distance_logp(with_feature_logps(obs, prep.fd, aof="identity"))
    tscores = score_components(
        scored,
        ["scene_id", "track_id"],
        ("volume_logp", "velocity_logp", "distance_logp"),
    )
    stats = track_stats(prep.tracked)
    cand = tscores.join(stats, ["scene_id", "track_id"]).where(
        (F.col("track_has_human") == 0) & (F.col("track_n_obs") >= MIN_TRACK_OBS)
    )
    return rank_components(cand)


def run_missing_tracks(
    spark: SparkSession, name: str = "lyft", scale: float = 1.0,
    ks: tuple[int, ...] = (10, 5, 1),
) -> dict:
    """Table 3 for dataset ``name``: precision@k of Fixy vs the ad-hoc
    consistency MA under random and confidence ordering.

    Per the paper, precision is averaged per scene over "every scene ...
    that we discovered errors" (scenes whose candidate pool contains at
    least one true error); for the internal dataset it is measured on
    the scene that failed audit. Also returns the §8.2 scene-level hit
    rate (fraction of scenes-with-errors whose top 10 contains a hit).
    """
    prep = prepare(spark, name, scale)
    return run_missing_tracks_prepared(spark, prep, name, ks)


def run_missing_tracks_prepared(
    spark: SparkSession, prep: Prepared, name: str, ks: tuple[int, ...] = (10, 5, 1)
) -> dict:
    truth = _track_truth(prep, spark)

    fixy = fixy_missing_track_candidates(prep).join(
        truth, ["scene_id", "track_id"]
    )
    fixy_pdf = fixy.toPandas()
    fixy_pdf["is_error"] = fixy_pdf["is_missing"]

    ma = consistency_candidates(prep.tracked).join(truth, ["scene_id", "track_id"])
    ma_pdf = ma.toPandas()
    ma_pdf["is_error"] = ma_pdf["is_missing"]
    # The MA has no severity score: random and confidence orderings.
    ma_rand = ma_pdf.copy()
    ma_rand["rank"] = (
        ma_rand.groupby("scene_id")["rand_order"].rank(method="first").astype(int)
    )
    ma_conf = ma_pdf.copy()
    ma_conf["rank"] = (
        ma_conf.groupby("scene_id")["track_mean_conf"]
        .rank(method="first", ascending=False)
        .astype(int)
    )

    if name == "internal":
        scenes = [INTERNAL_AUDIT_SCENE]
    else:
        scenes = sorted(ma_pdf.loc[ma_pdf["is_error"], "scene_id"].unique())

    out: dict = {"dataset": name, "n_scenes_with_errors": len(scenes)}
    for label, pdf in (("fixy", fixy_pdf), ("ma_rand", ma_rand), ("ma_conf", ma_conf)):
        deduped = _dedupe_errors(pdf)
        for k in ks:
            out[f"{label}_p{k}"] = mean_scene_precision_at_k(deduped, k, scenes=scenes)
    # Scene-level hit rate (§8.2: "LOA found errors in 100% of the
    # scenes with errors in the top 10 ranked errors").
    deduped = _dedupe_errors(fixy_pdf)
    hits = sum(
        1
        for s in scenes
        if not (g := deduped[deduped["scene_id"] == s]).empty
        and g.sort_values("rank")["is_error"].head(10).any()
    )
    out["fixy_scene_hit_rate"] = hits / len(scenes) if scenes else None
    return out


# --------------------------------------------------------------------
# §8.2 recall on the audited internal scene.
# --------------------------------------------------------------------


def run_recall(spark: SparkSession, scale: float = 1.0, prep: Prepared | None = None) -> dict:
    """Recall of Fixy on the exhaustively-audited internal scene: how
    many of its missing tracks appear "in the top 10 ranked errors
    per-class" (paper: 18 of 24 = 75%)."""
    prep = prep or prepare(spark, "internal", scale)
    truth = _track_truth(prep, spark)
    cand = fixy_missing_track_candidates(prep).join(truth, ["scene_id", "track_id"])
    audit = cand.where(F.col("scene_id") == INTERNAL_AUDIT_SCENE)
    # Top 10 per class, ranked by score within (scene, class).
    w = Window.partitionBy("scene_id", "maj_cls").orderBy(
        F.desc("score"), F.asc("track_id")
    )
    top = audit.withColumn("cls_rank", F.row_number().over(w)).where(
        F.col("cls_rank") <= 10
    )
    found = {
        int(r["maj_gt"])
        for r in top.where(F.col("is_missing")).select("maj_gt").collect()
    }
    mt = prep.ds.manifest.missing_tracks
    injected = set(
        mt.loc[mt["scene_id"] == INTERNAL_AUDIT_SCENE, "gt_track_id"].astype(int)
    )
    return {
        "n_injected": len(injected),
        "n_found": len(found & injected),
        "recall": len(found & injected) / len(injected) if injected else None,
    }


# --------------------------------------------------------------------
# §8.3 — missing observations within tracks.
# --------------------------------------------------------------------


def run_missing_obs(spark: SparkSession, scale: float = 1.0, prep: Prepared | None = None) -> dict:
    """Rank of the injected missing-observation-within-a-track.

    AOF (§8.3): zero the probability of observations in bundles with a
    human proposal, and of tracks without any human proposal — both are
    filters. Remaining model-only bundles inside human-containing
    tracks are ranked by likelihood, dataset-wide.
    """
    prep = prep or prepare(spark, "lyft", scale)
    obs = with_velocity(with_volume(prep.tracked))
    scored = with_feature_logps(obs, prep.fd, aof="identity")
    stats = track_stats(prep.tracked)
    human_tracks = stats.where(F.col("track_has_human") == 1).select(
        "scene_id", "track_id"
    )
    bundle_has_human = prep.tracked.groupBy("scene_id", "bundle_id").agg(
        F.max((F.col("source") != SOURCE_MODEL).cast("int")).alias("bh")
    )
    # "Bundle with a human proposal" is interpreted at any overlap, not
    # just the 0.5 association threshold: a model box that grazes a
    # human label (a near-miss of the bundler, or a fragment beside an
    # already-matched label) is evidence the object *is* labeled, so the
    # AOF zeroes it; a genuinely missing observation has no human box
    # anywhere near it in that frame.
    weak = overlapping_model_obs(prep.tracked, iou_threshold=0.05)
    cand_obs = (
        scored.join(human_tracks, ["scene_id", "track_id"])
        .join(bundle_has_human, ["scene_id", "bundle_id"])
        .where(F.col("bh") == 0)
        .join(weak, "obs_id", "left_anti")
    )
    bscores = score_components(
        cand_obs,
        ["scene_id", "track_id", "frame_id", "bundle_id"],
        ("volume_logp", "velocity_logp"),
    )
    # Truth: the bundle holds the model observation of the dropped frame.
    mo = prep.ds.manifest.missing_obs
    miss = spark.createDataFrame(
        mo, schema="scene_id string, gt_track_id long, frame_id int"
    ).withColumn("is_error", F.lit(True))
    # Observations of *whole-missing* objects can leak into this pool
    # when their model track chains onto a neighbouring labeled track:
    # they are genuine labeling errors, but of the §8.2 missing-track
    # kind, so they are reported separately rather than counted as
    # false positives here.
    mt = prep.ds.manifest.missing_tracks
    miss_tracks = spark.createDataFrame(
        mt[["scene_id", "gt_track_id"]], schema="scene_id string, gt_track_id long"
    ).withColumn("from_missing_track", F.lit(True))
    flagged = (
        bscores.join(
            prep.tracked.where(F.col("source") == SOURCE_MODEL).select(
                "scene_id", "bundle_id", "gt_track_id"
            ),
            ["scene_id", "bundle_id"],
        )
        .join(miss, ["scene_id", "gt_track_id", "frame_id"], "left")
        .join(miss_tracks, ["scene_id", "gt_track_id"], "left")
        .fillna({"is_error": False, "from_missing_track": False})
    )
    pdf = (
        flagged.select("scene_id", "bundle_id", "score", "is_error", "from_missing_track")
        .toPandas()
        .sort_values(["score", "bundle_id"], ascending=[False, True])
        .reset_index(drop=True)
    )
    pdf["rank"] = pdf.index + 1
    clean = pdf[~pdf["from_missing_track"]].reset_index(drop=True)
    clean["rank"] = clean.index + 1
    hits = clean[clean["is_error"]]
    # An injected drop is findable only if the detector kept that frame
    # and the weak-overlap filter didn't graze another object — like the
    # paper, where exactly one such findable example existed.
    return {
        "n_injected": int(len(mo)),
        "n_candidates": int(len(clean)),
        "n_missing_track_leaks": int(pdf["from_missing_track"].sum()),
        "n_found": int(len(hits)),
        "found": not hits.empty,
        "ranks": [int(r) for r in hits["rank"]],
        "best_rank": int(hits["rank"].min()) if not hits.empty else None,
        "expected_random_rank": (len(clean) + 1) / 2,
    }


# --------------------------------------------------------------------
# §8.4 — novel errors in ML model predictions.
# --------------------------------------------------------------------


def run_model_errors(
    spark: SparkSession, scale: float = 1.0, n_scenes: int = 5,
    prep: Prepared | None = None, k: int = 10,
) -> dict:
    """Find erroneous model predictions with no human labels (§7, §8.4).

    Ad-hoc MAs (appear, flicker, multibox) run first and their catches
    are *excluded*; Fixy then scores the remaining tracks with the
    inverting AOF (1 − p) over volume + velocity plus the count track
    feature, ranking the most implausible first. Compared against
    uncertainty sampling over the raw predictions.
    """
    prep = prep or prepare(spark, "lyft", scale)
    scene_ids = [
        r["scene_id"]
        for r in prep.ds.eval_obs.select("scene_id").distinct().orderBy("scene_id").limit(n_scenes).collect()
    ]
    model_obs = prep.ds.eval_obs.where(
        (F.col("source") == SOURCE_MODEL) & F.col("scene_id").isin(scene_ids)
    )
    # No human labels in this application: every observation is its own
    # bundle; tracks come from the cross-frame associator alone.
    tracked = assign_tracks(model_obs.withColumn("bundle_id", F.col("obs_id")))
    tracked = tracked.cache()

    excluded = (
        appear_flags(tracked)
        .unionByName(flicker_flags(tracked))
        .unionByName(multibox_flags(tracked))
        .distinct()
    )
    obs = with_velocity(with_volume(tracked))
    scored = with_feature_logps(obs, prep.fd, aof="invert")
    tscores = score_components(
        scored, ["scene_id", "track_id"], ("volume_logp", "velocity_logp")
    )
    stats = track_stats(tracked)
    cand = (
        tscores.join(stats, ["scene_id", "track_id"])
        .join(excluded.withColumn("_ex", F.lit(True)), ["scene_id", "track_id"], "left")
        .where(F.col("_ex").isNull() & (F.col("track_n_obs") >= MIN_TRACK_OBS))
    )
    truth = tracked.groupBy("scene_id", "track_id").agg(
        F.avg((F.col("err_type") != ERR_NONE).cast("double")).alias("err_frac"),
        F.max("confidence").alias("max_conf"),
    )
    ranked = (
        cand.join(truth, ["scene_id", "track_id"])
        .withColumn("is_error", F.col("err_frac") > 0.5)
        .orderBy(F.desc("score"), F.asc("track_id"))
        .limit(max(k * 4, 40))
        .toPandas()
    )
    fixy_top = ranked.head(k)
    fixy_p = precision_at_k(fixy_top["is_error"], k)
    found_errors = fixy_top[fixy_top["is_error"]]
    max_conf_found = float(found_errors["max_conf"].max()) if not found_errors.empty else None

    unc = rank_by_uncertainty(model_obs).where(F.col("rank") <= k).toPandas()
    unc_p = precision_at_k((unc.sort_values("rank")["err_type"] != ERR_NONE), k)
    tracked.unpersist()
    return {
        "n_scenes": len(scene_ids),
        "fixy_p10": fixy_p,
        "uncertainty_p10": unc_p,
        "max_conf_found_error": max_conf_found,
    }
