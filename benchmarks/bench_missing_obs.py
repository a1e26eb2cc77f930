"""Benchmark: §8.3 missing observation within a track."""
import json

from repro.eval.harness import run_missing_obs


def test_missing_obs(benchmark, spark, prep_lyft, record_result):
    result = benchmark.pedantic(
        lambda: run_missing_obs(spark, prep=prep_lyft), rounds=1, iterations=1
    )
    record_result("missing_obs", result)
    print("\nMISSING_OBS " + json.dumps(result, default=float))
    assert result["n_injected"] >= 1
