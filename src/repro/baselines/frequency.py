"""Frequent-pattern-mining baselines: SLCT, LFA, Logram.

These derive templates from token-frequency statistics; their published
weakness — low-frequency templates fall into wildcard/outlier buckets —
is inherent to the mechanism and reproduces here.
"""
from __future__ import annotations

from repro.baselines.base import Baseline
from repro.baselines.heuristic import WILD


class SLCT(Baseline):
    """SLCT (Vaarandi, IPOM'03): frequent (position, word) mining.

    A (position, word) pair is *frequent* if its duplicate-weighted
    support reaches ``support`` (absolute) or ``rel_support`` of the
    stream. A log's template keeps its frequent tokens and wildcards the
    rest; logs whose template contains no frequent token join a single
    outlier cluster.
    """

    name = "SLCT"

    def __init__(self, support: int = 10, rel_support: float = 0.002):
        self.support, self.rel_support = support, rel_support

    def parse_unique(self, uniq, counts):
        total = sum(counts)
        thr = max(self.support, int(self.rel_support * total))
        freq: dict[tuple, int] = {}
        for toks, c in zip(uniq, counts):
            for p, t in enumerate(toks):
                freq[(p, t)] = freq.get((p, t), 0) + c
        by_tmpl: dict[tuple, int] = {}
        labels = []
        for toks in uniq:
            tmpl = tuple(
                t if freq[(p, t)] >= thr else WILD for p, t in enumerate(toks)
            )
            if all(t == WILD for t in tmpl):
                tmpl = ("$outlier", len(toks))
            labels.append(by_tmpl.setdefault(tmpl, len(by_tmpl)))
        return labels


class LFA(Baseline):
    """LFA (Nagappan & Vouk, MSR'10): per-line frequency analysis.

    Token frequencies are tallied per (length, position); within each
    line, tokens whose frequency falls below the line's maximum are
    dynamic. No global support threshold, hence LFA's tendency to
    over-wildcard lines that mix common and rare constants.
    """

    name = "LFA"

    def parse_unique(self, uniq, counts):
        freq: dict[tuple, int] = {}
        for toks, c in zip(uniq, counts):
            for p, t in enumerate(toks):
                freq[(len(toks), p, t)] = freq.get((len(toks), p, t), 0) + c
        by_tmpl: dict[tuple, int] = {}
        labels = []
        for toks in uniq:
            fs = [freq[(len(toks), p, t)] for p, t in enumerate(toks)]
            mx = max(fs, default=1)
            tmpl = tuple(
                t if f * 2 > mx else WILD for t, f in zip(toks, fs)
            )
            labels.append(by_tmpl.setdefault(tmpl, len(by_tmpl)))
        return labels


class Logram(Baseline):
    """Logram (Dai et al., TSE'20): n-gram dictionary parsing.

    Builds duplicate-weighted 2-gram/3-gram dictionaries; a token is
    dynamic when the n-grams covering it are rare (below ``threshold``
    weighted occurrences). Clusters are the resulting templates.
    """

    name = "Logram"

    def __init__(self, threshold: int | None = None):
        self.threshold = threshold

    def parse_unique(self, uniq, counts):
        # Published Logram derives its threshold from the corpus; scale
        # with volume so frequent variables stay dynamic.
        thr = self.threshold or max(3, sum(counts) // 128)
        two: dict[tuple, int] = {}
        three: dict[tuple, int] = {}
        for toks, c in zip(uniq, counts):
            for i in range(len(toks) - 1):
                two[toks[i : i + 2]] = two.get(toks[i : i + 2], 0) + c
            for i in range(len(toks) - 2):
                three[toks[i : i + 3]] = three.get(toks[i : i + 3], 0) + c
        by_tmpl: dict[tuple, int] = {}
        labels = []
        for toks in uniq:
            n = len(toks)
            dyn = [False] * n
            for i in range(n):
                grams3 = [toks[j : j + 3] for j in range(max(0, i - 2), min(i + 1, n - 2))]
                if grams3:
                    if all(three.get(g, 0) < thr for g in grams3):
                        # Check 2-grams before declaring dynamic.
                        grams2 = [toks[j : j + 2] for j in range(max(0, i - 1), min(i + 1, n - 1))]
                        if all(two.get(g, 0) < thr for g in grams2):
                            dyn[i] = True
                elif n >= 2:
                    grams2 = [toks[j : j + 2] for j in range(max(0, i - 1), min(i + 1, n - 1))]
                    if grams2 and all(two.get(g, 0) < thr for g in grams2):
                        dyn[i] = True
            tmpl = tuple(WILD if d else t for t, d in zip(toks, dyn))
            labels.append(by_tmpl.setdefault(tmpl, len(by_tmpl)))
        return labels
