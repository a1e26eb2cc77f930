"""Benchmark: Table 3 (missing-track precision, both datasets)."""
import json

from repro.eval.harness import run_missing_tracks_prepared


def test_table3_lyft(benchmark, spark, prep_lyft, record_result):
    result = benchmark.pedantic(
        lambda: run_missing_tracks_prepared(spark, prep_lyft, "lyft"),
        rounds=1, iterations=1,
    )
    record_result("table3_lyft", result)
    print("\nTABLE3_LYFT " + json.dumps(result, default=float))
    assert result["fixy_p10"] is not None


def test_table3_internal(benchmark, spark, prep_internal, record_result):
    result = benchmark.pedantic(
        lambda: run_missing_tracks_prepared(spark, prep_internal, "internal"),
        rounds=1, iterations=1,
    )
    record_result("table3_internal", result)
    print("\nTABLE3_INTERNAL " + json.dumps(result, default=float))
    assert result["fixy_p10"] is not None
