"""§5.4 efficiency-ablation bench: training time with techniques off.

The paper's Fig. 9 shows deduplication & friends dominating efficiency;
here each variant's wall time is measured on one corpus so the ordering
(full pipeline fastest, w/o dedup slowest) is visible in bench output.
"""
import pytest

from repro.core import ParserConfig, train_model_sequential
from repro.logs import loghub_lite

VARIANTS = {
    "full": {},
    "no_dedup": {"dedup": False},
    "no_early_stop": {"early_stop": False},
    "no_balanced": {"balanced": False},
    "no_variable_saturation": {"variable_credit": False},
}


@pytest.fixture(scope="module")
def corpus():
    pdf, _ = loghub_lite("Zookeeper")
    return pdf["message"].tolist()


@pytest.mark.parametrize("variant", list(VARIANTS))
def test_bench_ablation_variant(benchmark, corpus, variant):
    cfg = ParserConfig().ablate(**VARIANTS[variant])
    model = benchmark.pedantic(
        lambda: train_model_sequential(corpus, cfg), rounds=1, iterations=1
    )
    assert len(model.nodes) > 0
