"""Benchmark: §8.2 recall on the audited internal scene."""
import json

from repro.eval.harness import run_recall


def test_recall_audited_scene(benchmark, spark, prep_internal, record_result):
    result = benchmark.pedantic(
        lambda: run_recall(spark, prep=prep_internal), rounds=1, iterations=1
    )
    record_result("recall", result)
    print("\nRECALL " + json.dumps(result, default=float))
    assert result["n_injected"] == 24
