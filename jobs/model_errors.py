"""Reproduce §8.4: precision@10 for novel ML-prediction errors after
excluding ad-hoc MA catches (paper: Fixy 82% vs uncertainty 42%), and
the highest confidence among found errors (paper: up to 95%).

Usage: spark-submit jobs/model_errors.py [scale]
"""
import sys

sys.path.insert(0, ".")
from jobs._common import emit, get_spark  # noqa: E402

from repro.eval.harness import run_model_errors  # noqa: E402


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("model_errors")
    emit("§8.4 novel model-prediction errors", run_model_errors(spark, scale))


if __name__ == "__main__":
    main()
