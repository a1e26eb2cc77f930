"""Canonical observation schema shared by every pipeline stage.

An *observation* (paper §3: human-proposed labels and ML model outputs)
is one 3D bounding box from one source in one frame. All stages —
generation, association, feature computation, scoring — exchange
DataFrames with (a superset of) these columns.

Ground-truth bookkeeping columns (``gt_track_id``, ``err_type``) exist
only so the evaluation harness can compute precision/recall against the
injected-error manifest; Fixy itself never reads them.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import types as T

#: Observation sources (paper §8.1 "Observation sources").
SOURCE_HUMAN = "human"
SOURCE_MODEL = "model"

#: The object classes evaluated in the paper (§8.1: "the common classes
#: of car, truck, pedestrian, and motorcycle").
CLASSES = ("car", "truck", "pedestrian", "motorcycle")

#: Model-error taxonomy attached by the detector simulator (eval only).
ERR_NONE = "none"  #: clean prediction of a ground-truth object
ERR_GHOST = "ghost"  #: spurious, temporally-inconsistent prediction
ERR_SUBTLE = "subtle"  #: consistent but physically implausible (§8.4)

OBS_FIELDS = [
    ("scene_id", T.StringType()),
    ("frame_id", T.IntegerType()),
    ("t", T.DoubleType()),  # seconds since scene start
    ("source", T.StringType()),  # human | model
    ("obs_id", T.LongType()),  # globally unique
    ("cls", T.StringType()),
    ("cx", T.DoubleType()),  # box center, metres, AV at origin
    ("cy", T.DoubleType()),
    ("cz", T.DoubleType()),
    ("length", T.DoubleType()),
    ("width", T.DoubleType()),
    ("height", T.DoubleType()),
    ("confidence", T.DoubleType()),  # 1.0 for human labels
    ("gt_track_id", T.LongType()),  # -1 for ghost predictions (eval only)
    ("err_type", T.StringType()),  # eval only
]

OBS_SCHEMA = T.StructType([T.StructField(n, t, True) for n, t in OBS_FIELDS])

#: Columns every observation DataFrame must carry.
OBS_COLUMNS = tuple(n for n, _ in OBS_FIELDS)


def validate_observations(df: DataFrame) -> DataFrame:
    """Assert ``df`` carries the canonical observation columns.

    Returns ``df`` (for chaining). Raises ``ValueError`` naming the
    missing columns otherwise — a schema drift caught at the stage
    boundary beats a null-filled join output three stages later.
    """
    missing = [c for c in OBS_COLUMNS if c not in df.columns]
    if missing:
        raise ValueError(f"observation DataFrame missing columns: {missing}")
    return df
