"""Table-4 bench: training + threshold-query on Android wakelock logs."""
import sys

sys.path.insert(0, "jobs")

from table4_saturation_templates import run as table4_run  # noqa: E402


def test_bench_table4(benchmark):
    out = benchmark.pedantic(lambda: table4_run(n_logs=1000), rounds=2, iterations=1)
    assert set(out) == {0.05, 0.78, 0.9, 0.95}
