"""Reproduce §8.2's recall result: missing tracks found in the top 10
per class on the exhaustively-audited internal scene (paper: 18/24).

Usage: spark-submit jobs/recall.py [scale]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import emit, get_spark  # noqa: E402

from repro.eval.harness import run_recall  # noqa: E402


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("recall")
    emit("§8.2 recall (audited internal scene)", run_recall(spark, scale))


if __name__ == "__main__":
    main()
