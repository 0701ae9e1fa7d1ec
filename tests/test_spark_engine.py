"""Tests for the distributed Spark dataflow engine (Section VI-A),
cross-checked against the sequential engine and brute force."""
import pytest

from tests.helpers import small_instance
from repro.baselines.bruteforce import brute_force
from repro.core.local_engine import hgmatch
from repro.dist.engine import (
    collect_embeddings_query_edge_order,
    spark_hgmatch,
    spark_hgmatch_count,
)
from repro.dist.storage import build_spark_hypergraph
from repro.experiments.datasets import make_dataset
from repro.hyper.model import Hypergraph, fig1_data, fig1_query
from repro.hyper.queries import QuerySetting, sample_query
from repro.hyper.storage import SignatureStore


@pytest.fixture(scope="module", autouse=True)
def few_shuffle_partitions(spark):
    """The engine's per-step joins run at toy scale here; 64 shuffle
    partitions would dominate runtime."""
    old = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    yield
    spark.conf.set("spark.sql.shuffle.partitions", old)


@pytest.fixture(scope="module")
def fig1(spark):
    H, q = fig1_data(), fig1_query()
    return H, q, build_spark_hypergraph(spark, H)


class TestFig1:
    def test_count(self, spark, fig1):
        H, q, sh = fig1
        assert spark_hgmatch_count(spark, sh, q) == 2

    def test_embeddings(self, spark, fig1):
        H, q, sh = fig1
        df, plan = spark_hgmatch(spark, sh, q)
        assert collect_embeddings_query_edge_order(df, plan) == {
            (0, 2, 4),
            (1, 3, 5),
        }

    def test_explicit_phi(self, spark, fig1):
        H, q, sh = fig1
        assert spark_hgmatch_count(spark, sh, q, phi=[2, 1, 0]) == 2

    def test_single_edge_query(self, spark, fig1):
        H, _, sh = fig1
        q1 = Hypergraph(["A", "C"], [[0, 1]])
        assert spark_hgmatch_count(spark, sh, q1) == 2

    def test_absent_signature_zero(self, spark, fig1):
        H, _, sh = fig1
        q0 = Hypergraph(["C", "C"], [[0, 1]])
        assert spark_hgmatch_count(spark, sh, q0) == 0


class TestCrossValidation:
    @pytest.mark.parametrize("seed", [0, 1, 2, 3])
    def test_random_instances_vs_brute_force(self, spark, seed):
        inst = small_instance(seed)
        if inst is None:
            pytest.skip("no connected query")
        H, store, q = inst
        bf, bft = brute_force(H, q, collect=True)
        sh = build_spark_hypergraph(spark, H)
        df, plan = spark_hgmatch(spark, sh, q)
        assert collect_embeddings_query_edge_order(df, plan) == bft

    def test_catalog_dataset_vs_local_engine(self, spark):
        H = make_dataset("CH", scale=0.25, seed=0)
        store = SignatureStore(H)
        sq = sample_query(H, QuerySetting("q2", 2, 2, 15), seed=2)
        expected = hgmatch(H, store, sq.query).count
        sh = build_spark_hypergraph(spark, H)
        assert spark_hgmatch_count(spark, sh, sq.query) == expected

    def test_high_arity_dataset_vs_local_engine(self, spark):
        H = make_dataset("HC", scale=0.3, seed=0)
        store = SignatureStore(H)
        sq = sample_query(H, QuerySetting("q2", 2, 2, 60), seed=4)
        expected = hgmatch(H, store, sq.query).count
        sh = build_spark_hypergraph(spark, H)
        assert spark_hgmatch_count(spark, sh, sq.query) == expected


class TestDataflowShape:
    def test_plan_carried_through(self, spark, fig1):
        H, q, sh = fig1
        df, plan = spark_hgmatch(spark, sh, q)
        assert plan.n_steps == 3
        assert df.columns == ["emb"]

    def test_lazy_until_action(self, spark, fig1):
        # Building the dataflow must not trigger any job.
        H, q, sh = fig1
        df, _ = spark_hgmatch(spark, sh, q)
        assert df.schema is not None  # analysis only, no execution
