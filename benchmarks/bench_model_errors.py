"""Benchmark: §8.4 novel model-prediction errors (5 Lyft scenes)."""
import json

from repro.eval.harness import run_model_errors


def test_model_errors(benchmark, spark, prep_lyft, record_result):
    result = benchmark.pedantic(
        lambda: run_model_errors(spark, prep=prep_lyft), rounds=1, iterations=1
    )
    record_result("model_errors", result)
    print("\nMODEL_ERRORS " + json.dumps(result, default=float))
    assert result["fixy_p10"] is not None
