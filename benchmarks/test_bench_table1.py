"""Table-1 bench: synthetic corpus generation throughput."""
from repro.logs import loghub2_lite, loghub_lite


def test_bench_loghub_lite_generation(benchmark):
    benchmark.pedantic(lambda: loghub_lite("Mac"), rounds=2, iterations=1)


def test_bench_loghub2_lite_generation(benchmark):
    benchmark.pedantic(lambda: loghub2_lite("Zookeeper", scale=0.5), rounds=2, iterations=1)
