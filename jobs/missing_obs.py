"""Reproduce §8.3: rank of the injected missing observation within a
human-labeled track (paper: ranked first among candidate bundles).

Usage: spark-submit jobs/missing_obs.py [scale]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import emit, get_spark  # noqa: E402

from repro.eval.harness import run_missing_obs  # noqa: E402


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("missing_obs")
    emit("§8.3 missing observation within track", run_missing_obs(spark, scale))


if __name__ == "__main__":
    main()
