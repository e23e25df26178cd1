"""Simulated semantic baselines: UniParser, LogPPT, LILAC.

The real systems need a GPU-trained token classifier (UniParser), a
RoBERTa prompt-tuned model (LogPPT) or a hosted LLM with an adaptive
parsing cache (LILAC) — none of which exists in this offline container.
Following the substitution rule (DESIGN.md §3.2), each is simulated as a
*noisy oracle*: it sees the generator's ground-truth template for a log
and corrupts it at a calibrated rate, reproducing the published
behaviour shape — near-perfect grouping accuracy on small corpora,
UniParser/LogPPT degrading with template diversity on LogHub-2.0
(Table 3), LILAC staying strong thanks to its template cache — and
throughput orders of magnitude below the syntax parsers via a
per-inference latency charge.

Corruption is decided *per template* (seeded, deterministic): a split
corruption parses one template inconsistently (the published
LLM-inconsistency failure mode LILAC's cache suppresses), a merge
corruption conflates a template with its neighbour (classifier
confusion). The calibration constants below were fit once against the
published Table-2/Table-3 averages and are not tuned per run.
"""
from __future__ import annotations

import time
import zlib

import numpy as np

from repro.baselines.base import Baseline


class SimulatedSemanticParser(Baseline):
    """Noisy-oracle stand-in for a semantic/LLM parser.

    ``parse`` requires ground truth: call ``bind(gt_ids)`` with the
    per-message template ids before parsing. ``err_base`` is the
    per-template corruption probability on a small corpus;
    ``err_scale`` adds corruption with template-bank diversity
    (≈ published LogHub-2.0 degradation); ``cache`` simulates LILAC's
    adaptive parsing cache (one inference per *template*, consistent
    verdicts); otherwise every unique message pays ``latency`` seconds.
    """

    name = "Semantic"

    def __init__(
        self,
        err_base: float,
        err_scale: float,
        latency: float,
        cache: bool,
        seed: int = 0,
    ):
        self.err_base, self.err_scale = err_base, err_scale
        self.latency, self.cache, self.seed = latency, cache, seed
        self._gt: list[int] | None = None

    def bind(self, gt_ids: list[int]) -> "SimulatedSemanticParser":
        self._gt = list(gt_ids)
        return self

    # The oracle works per message, not per unique token sequence.
    def parse(self, messages: list[str], budget_s: float | None = None) -> list:
        if self._gt is None or len(self._gt) != len(messages):
            raise ValueError("bind(gt_ids) with one id per message before parse()")
        gt = self._gt
        n_templates = len(set(gt))
        err = min(0.9, self.err_base + self.err_scale * n_templates)
        rng = np.random.default_rng((self.seed, n_templates))
        verdict: dict[int, tuple[str, int]] = {}
        for t in sorted(set(gt)):
            r = rng.random()
            if r < err * 0.5:
                verdict[t] = ("split", 0)
            elif r < err:
                verdict[t] = ("merge", (t + 1) % max(n_templates, 1))
            else:
                verdict[t] = ("ok", t)
        # Inference cost: one call per unique message (or per template
        # with LILAC's cache). Charged once, outside the per-log loop.
        uniq_msgs = len(set(messages))
        calls = len(verdict) if self.cache else uniq_msgs
        if self.latency > 0:
            time.sleep(self.latency * calls)
        out = []
        for msg, t in zip(messages, gt):
            kind, val = verdict[t]
            if kind == "ok":
                out.append(t)
            elif kind == "merge":
                out.append(val)
            else:
                # Inconsistent parses: the verdict depends on the
                # message's variable content, splitting the group.
                out.append((t, zlib.crc32(msg.encode()) & 1))
        return out

    def parse_unique(self, uniq, counts):  # pragma: no cover - unused
        raise NotImplementedError


def uniparser(seed: int = 0) -> SimulatedSemanticParser:
    """UniParser: strong on LogHub, degrades with template diversity."""
    p = SimulatedSemanticParser(0.005, 0.00035, latency=0.0004, cache=False, seed=seed)
    p.name = "UniParser"
    return p


def logppt(seed: int = 0) -> SimulatedSemanticParser:
    """LogPPT: few-shot prompt-tuned, noisier at scale than UniParser."""
    p = SimulatedSemanticParser(0.04, 0.00045, latency=0.0008, cache=False, seed=seed)
    p.name = "LogPPT"
    return p


def lilac(seed: int = 0) -> SimulatedSemanticParser:
    """LILAC: LLM + adaptive parsing cache — accurate and consistent,
    but each cache miss pays an LLM round trip."""
    p = SimulatedSemanticParser(0.03, 0.00002, latency=0.01, cache=True, seed=seed)
    p.name = "LILAC"
    return p
