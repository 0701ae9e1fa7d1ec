"""Tests for the synth_data hypergraph extensions and provided
TPC-H-lite generators' wiring with the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestHypergraphFrames:
    def test_edges_frame_schema(self, spark):
        df = synth_data.hypergraph_edges(spark, name="CH", sf=0.02, seed=0)
        assert set(df.columns) == {"eid", "sig", "vs", "ls"}
        assert df.count() > 0

    def test_incidence_consistent_with_edges(self, spark):
        edges = synth_data.hypergraph_edges(spark, name="CH", sf=0.02, seed=0)
        inc = synth_data.hypergraph_incidence(spark, name="CH", sf=0.02, seed=0)
        total = edges.select(F.sum(F.size("vs"))).collect()[0][0]
        assert inc.count() == total

    def test_deterministic_in_seed(self, spark):
        a = synth_data.hypergraph_incidence(spark, name="CP", sf=0.02, seed=1)
        b = synth_data.hypergraph_incidence(spark, name="CP", sf=0.02, seed=1)
        assert sorted(map(tuple, a.collect())) == sorted(map(tuple, b.collect()))

    def test_incidence_counts_vs_oracle(self, spark):
        inc = synth_data.hypergraph_incidence(spark, name="CP", sf=0.02, seed=0)
        got = inc.groupBy("eid").agg(F.count("*").alias("arity"))
        assert_equivalent(
            got,
            "SELECT eid, count(*)::BIGINT AS arity FROM incidence GROUP BY eid",
            incidence=inc,
        )


class TestProvidedGenerators:
    """The scaffolding's TPC-H-lite generators stay usable alongside the
    hypergraph schema (regression guard for the shared module)."""

    def test_lineitem_small(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).first()["count"]
        )
        assert top > 5000 / 100  # head key well above uniform share

    def test_lineitem_aggregate_vs_oracle(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.count("*").alias("n"), F.round(F.sum("l_quantity"), 6).alias("qty")
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, count(*)::BIGINT AS n,
                   round(sum(l_quantity), 6) AS qty
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )
