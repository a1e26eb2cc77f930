"""Uncertainty sampling baseline (§8.1, §8.4).

"We additionally compared to uncertainty sampling, in which we sampled
predictions around a confidence threshold" — the standard active-
learning heuristic [26]. Predictions are ranked by closeness of their
confidence to the threshold; the closest are the "most uncertain" and
get audited first.

Its failure mode, which §8.4 demonstrates, is structural: a detector
error the model is *confident* about (the subtle errors, confidence up
to 0.95) is maximally far from the threshold and is never surfaced.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.schema import SOURCE_MODEL

DEFAULT_THRESHOLD = 0.5


def rank_by_uncertainty(obs: DataFrame, threshold: float = DEFAULT_THRESHOLD) -> DataFrame:
    """Rank model predictions by ``|confidence − threshold|`` ascending.

    Returns model observations with ``uncertainty`` and a global
    1-based ``rank`` (ties broken by ``obs_id`` for determinism).
    """
    model = obs.where(F.col("source") == SOURCE_MODEL)
    ranked = model.withColumn(
        "uncertainty", F.abs(F.col("confidence") - F.lit(threshold))
    )
    w = Window.orderBy(F.asc("uncertainty"), F.asc("obs_id"))
    return ranked.withColumn("rank", F.row_number().over(w))
