"""Offline phase: learning feature distributions from existing labels.

Paper §5.2: "Given features, Fixy can automatically fit feature
distributions over existing training datasets. ... Fixy first
exhaustively generates the features over the data and collects the
scalar or vector values. Then, for each feature, Fixy executes the
fitting function over the scalar/vector values."

We do exactly that: feature generation runs as Spark dataflow over the
training labels; the resulting *scalars* (a few per label — tiny
compared to the data) are collected to the driver where the fitting
function (KDE by default) runs per (feature, class). The fitted
distributions are small picklable objects that scoring broadcasts back
to executors inside pandas UDFs.

Distributions are class-conditional (Table 2: "Class-conditional box
volume", "Class-conditional object velocity") — a 30 m³ volume is
normal for a truck and wildly anomalous for a pedestrian.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.features import with_velocity, with_volume
from repro.core.kde import GaussianKDE


@dataclass
class FeatureDistributions:
    """Fitted class-conditional distributions, keyed by class name."""

    volume: dict[str, GaussianKDE] = field(default_factory=dict)
    velocity: dict[str, GaussianKDE] = field(default_factory=dict)

    def classes(self) -> set[str]:
        return set(self.volume) | set(self.velocity)


def learn_feature_distributions(
    train_labels: DataFrame, dist_cls=GaussianKDE, min_samples: int = 8
) -> FeatureDistributions:
    """Fit class-conditional volume and velocity distributions.

    Args:
        train_labels: human labels over training scenes (canonical
            observation schema). Their vendor instance id
            (``gt_track_id``) keys the transition feature.
        dist_cls: fitting function/class with a ``fit(values)``
            classmethod — the user-overridable estimator of §5.2.
        min_samples: classes with fewer feature values than this are
            skipped (cannot support a density estimate).

    Returns:
        :class:`FeatureDistributions`.
    """
    feats = with_volume(train_labels)
    feats = with_velocity(
        feats.withColumn("track_id", F.col("gt_track_id").cast("string"))
    )
    pdf = feats.select("cls", "volume", "velocity").toPandas()
    fd = FeatureDistributions()
    for cls, grp in pdf.groupby("cls"):
        vol = grp["volume"].dropna().to_numpy()
        if vol.size >= min_samples:
            fd.volume[cls] = dist_cls.fit(vol)
        vel = grp["velocity"].dropna().to_numpy()
        if vel.size >= min_samples:
            fd.velocity[cls] = dist_cls.fit(vel)
    return fd
