"""Benchmark: the distributed Spark dataflow engine end to end.

One q2 query on the WT stand-in through SCAN -> EXPAND -> SINK(count),
with the shuffle-join candidate pipeline (broadcast joins disabled by
the session fixture, so the exchange path is exercised).
"""
import pytest

from repro.core.local_engine import hgmatch
from repro.dist.engine import spark_hgmatch_count
from repro.dist.storage import build_spark_hypergraph
from repro.experiments.datasets import make_dataset
from repro.hyper.queries import QuerySetting, sample_query
from repro.hyper.storage import SignatureStore


@pytest.fixture(scope="module")
def workload(spark):
    H = make_dataset("WT", scale=0.5, seed=0)
    q = sample_query(H, QuerySetting("q2", 2, 2, 20), seed=2).query
    sh = build_spark_hypergraph(spark, H)
    expected = hgmatch(H, SignatureStore(H), q).count
    return sh, q, expected


def test_bench_spark_hgmatch_q2(benchmark, spark, workload):
    sh, q, expected = workload
    count = benchmark.pedantic(
        spark_hgmatch_count, args=(spark, sh, q), rounds=2, iterations=1
    )
    assert count == expected
