"""Tests for the provided TPC-H-lite generators and the paper-schema
extension, with DuckDB-oracle checks over the generated relations."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.schema import validate_observations
from repro.oracle import assert_equivalent


class TestTpchLite:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_deterministic_in_seed(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=7).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=7).toPandas()
        assert a.equals(b)

    def test_join_agg_oracle(self, spark):
        # The provided generators + oracle work end to end: a grouped
        # join in Spark matches DuckDB over identical input.
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS n, round(sum(l_quantity), 2) AS qty
            FROM li JOIN o ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li, o=o,
        )

    def test_zipf_keys_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=20_000, n_keys=1000)
        top = z.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["k"] == 1  # rank-1 key dominates under zipf


class TestPerceptionExtension:
    def test_perception_observations_schema(self, spark):
        obs = synth_data.perception_observations(spark, dataset="internal", scale=0.16)
        validate_observations(obs)
        assert obs.count() > 0

    def test_unknown_dataset_raises(self, spark):
        with pytest.raises(KeyError):
            synth_data.perception_observations(spark, dataset="nope")
