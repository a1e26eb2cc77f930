"""Precision/recall metrics used in §8.

The paper audits the top-k ranked candidates per scene and reports
precision among them ("In some cases, fewer than 10 potential errors
were flagged; we use the maximum number in these cases" — so the
denominator is ``min(k, n_flagged)``), averaged over the scenes where
errors were discovered.

Rankings are small (tens of tracks per scene), so metric arithmetic is
pandas on the driver; :func:`spark_precision_at_k` provides the same
computation as a Spark aggregation so the DuckDB oracle can pin the
semantics in tests.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def precision_at_k(flags: pd.Series | list, k: int) -> float | None:
    """Precision among the first ``min(k, len)`` entries of an ordered
    0/1 error-flag sequence; ``None`` when nothing was flagged."""
    flags = list(flags)[: max(k, 0)]
    if not flags:
        return None
    return float(sum(bool(f) for f in flags)) / len(flags)


def mean_scene_precision_at_k(
    ranked: pd.DataFrame, k: int, scene_col: str = "scene_id",
    rank_col: str = "rank", flag_col: str = "is_error",
    scenes: list | None = None,
) -> float | None:
    """Average per-scene precision@k (the Table 3 statistic).

    Args:
        ranked: one row per flagged candidate with a per-scene rank and
            a boolean error flag.
        scenes: the scenes to average over (the paper averages over
            scenes where errors were discovered); defaults to all scenes
            present in ``ranked``.
    """
    per_scene = []
    groups = dict(list(ranked.groupby(scene_col)))
    for s in scenes if scenes is not None else sorted(groups):
        grp = groups.get(s)
        if grp is None or grp.empty:
            continue
        p = precision_at_k(grp.sort_values(rank_col)[flag_col], k)
        if p is not None:
            per_scene.append(p)
    return float(pd.Series(per_scene).mean()) if per_scene else None


def spark_precision_at_k(ranked: DataFrame, k: int) -> DataFrame:
    """Per-scene precision@k as a Spark aggregation (oracle-checkable).

    ``ranked`` needs ``scene_id``, ``rank`` (1-based, dense per scene)
    and boolean ``is_error``. Returns ``(scene_id, precision)``.
    """
    top = ranked.where(F.col("rank") <= k)
    return (
        top.groupBy("scene_id")
        .agg(
            (
                F.sum(F.col("is_error").cast("double")) / F.count("*")
            ).alias("precision")
        )
    )


def recall(found: set, truth: set) -> float | None:
    """|found ∩ truth| / |truth|; ``None`` for empty truth."""
    if not truth:
        return None
    return len(set(found) & set(truth)) / len(truth)
