"""Simulated semantic baselines (DESIGN.md §3.2)."""
import pytest

from repro.baselines.semantic import SimulatedSemanticParser, lilac, logppt, uniparser
from repro.eval.ga import grouping_accuracy


def corpus(n_templates: int, per: int = 20):
    msgs, gt = [], []
    for t in range(n_templates):
        for i in range(per):
            msgs.append(f"template {t} instance {i}")
            gt.append(t)
    return msgs, gt


class TestOracle:
    def test_requires_bind(self):
        with pytest.raises(ValueError):
            uniparser().parse(["a"])

    def test_bind_length_checked(self):
        p = uniparser().bind([1, 2])
        with pytest.raises(ValueError):
            p.parse(["only one"])

    def test_deterministic(self):
        msgs, gt = corpus(20)
        a = uniparser().bind(gt).parse(msgs)
        b = uniparser().bind(gt).parse(msgs)
        assert a == b

    def test_high_accuracy_small_bank(self):
        msgs, gt = corpus(10)
        for factory in (uniparser, logppt, lilac):
            p = factory()
            p.latency = 0.0
            ga = grouping_accuracy(p.bind(gt).parse(msgs), gt)
            assert ga >= 0.8, factory.__name__

    def test_uniparser_degrades_with_diversity(self):
        """Published Table-3 shape: UniParser/LogPPT degrade as the
        template bank grows; LILAC's cache keeps it strong."""
        small_m, small_gt = corpus(10)
        big_m, big_gt = corpus(900, per=3)
        for factory in (uniparser, logppt):
            p1, p2 = factory(), factory()
            p1.latency = p2.latency = 0.0
            ga_small = grouping_accuracy(p1.bind(small_gt).parse(small_m), small_gt)
            ga_big = grouping_accuracy(p2.bind(big_gt).parse(big_m), big_gt)
            assert ga_big < ga_small
        l1, l2 = lilac(), lilac()
        l1.latency = l2.latency = 0.0
        ga_l_big = grouping_accuracy(l2.bind(big_gt).parse(big_m), big_gt)
        assert ga_l_big >= 0.85

    def test_latency_charged_per_call(self):
        import time

        msgs, gt = corpus(5, per=10)
        p = SimulatedSemanticParser(0.0, 0.0, latency=0.004, cache=True)
        t0 = time.perf_counter()
        p.bind(gt).parse(msgs)
        cached = time.perf_counter() - t0
        q = SimulatedSemanticParser(0.0, 0.0, latency=0.004, cache=False)
        t0 = time.perf_counter()
        q.bind(gt).parse(msgs)
        uncached = time.perf_counter() - t0
        # 5 template calls vs 50 unique-message calls.
        assert uncached > cached
