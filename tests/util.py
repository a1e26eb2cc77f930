"""Shared test helpers: compact observation-row builders.

``make_obs_df`` lets tests construct canonical observation DataFrames
from terse dicts — unspecified fields get physically sensible defaults
(a car-sized box at the origin).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.schema import ERR_NONE, OBS_COLUMNS, OBS_SCHEMA

_DEFAULTS = {
    "scene_id": "s0",
    "frame_id": 0,
    "t": None,  # derived from frame_id at 5 Hz unless given
    "source": "model",
    "obs_id": None,  # derived from row position unless given
    "cls": "car",
    "cx": 0.0,
    "cy": 0.0,
    "cz": 0.8,
    "length": 4.5,
    "width": 1.9,
    "height": 1.6,
    "confidence": 0.9,
    "gt_track_id": 0,
    "err_type": ERR_NONE,
}


def make_obs_rows(rows: list[dict]) -> pd.DataFrame:
    """Fill defaults into compact row dicts; returns canonical pandas."""
    full = []
    for i, r in enumerate(rows):
        d = dict(_DEFAULTS, **r)
        if d["t"] is None:
            d["t"] = d["frame_id"] * 0.2
        if d["obs_id"] is None:
            d["obs_id"] = i
        full.append(d)
    pdf = pd.DataFrame(full)[list(OBS_COLUMNS)]
    pdf["frame_id"] = pdf["frame_id"].astype("int32")
    pdf["obs_id"] = pdf["obs_id"].astype("int64")
    pdf["gt_track_id"] = pdf["gt_track_id"].astype("int64")
    return pdf


def make_obs_df(spark: SparkSession, rows: list[dict]) -> DataFrame:
    """Spark observation DataFrame from compact row dicts."""
    return spark.createDataFrame(make_obs_rows(rows), schema=OBS_SCHEMA)
