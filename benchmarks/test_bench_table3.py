"""Table-3 bench: ByteBrain on LogHub-2.0-lite scale (Spark pipeline)."""
import pytest

from repro.eval.harness import run_bytebrain_sequential, run_bytebrain_spark
from repro.logs import loghub2_lite


@pytest.fixture(scope="module")
def corpus():
    pdf, _ = loghub2_lite("Zookeeper", scale=0.5)
    return pdf


def test_bench_bytebrain2_spark(benchmark, spark, corpus):
    r = benchmark.pedantic(
        lambda: run_bytebrain_spark(spark, "Zookeeper", corpus), rounds=1, iterations=1
    )
    assert r.ga > 0.5


def test_bench_bytebrain2_sequential(benchmark, corpus):
    r = benchmark.pedantic(
        lambda: run_bytebrain_sequential("Zookeeper", corpus), rounds=1, iterations=1
    )
    assert r.ga > 0.5
