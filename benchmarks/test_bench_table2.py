"""Table-2 bench: per-method train+match wall time on LogHub-lite.

One representative dataset; the full 16-dataset matrix is produced by
``jobs/table2_loghub_accuracy.py`` and recorded in EXPERIMENTS.md.
"""
import pytest

from repro.eval.harness import run_baseline, run_bytebrain_sequential, run_bytebrain_spark
from repro.logs import loghub_lite


@pytest.fixture(scope="module")
def corpus():
    pdf, _ = loghub_lite("HDFS")
    return pdf


def test_bench_bytebrain_spark(benchmark, spark, corpus):
    r = benchmark.pedantic(
        lambda: run_bytebrain_spark(spark, "HDFS", corpus), rounds=1, iterations=1
    )
    assert r.ga > 0.5


def test_bench_bytebrain_sequential(benchmark, corpus):
    r = benchmark.pedantic(
        lambda: run_bytebrain_sequential("HDFS", corpus), rounds=2, iterations=1
    )
    assert r.ga > 0.5


@pytest.mark.parametrize("method", ["Drain", "AEL", "Spell", "IPLoM", "LILAC"])
def test_bench_baseline(benchmark, corpus, method):
    r = benchmark.pedantic(
        lambda: run_baseline(method, "HDFS", corpus, budget_s=60), rounds=1, iterations=1
    )
    assert not r.failed
