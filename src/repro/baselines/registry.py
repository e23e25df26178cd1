"""Baseline registry: name -> factory, as benchmarked in Tables 2/3."""
from __future__ import annotations

from typing import Callable

from repro.baselines.base import Baseline
from repro.baselines.frequency import LFA, SLCT, Logram
from repro.baselines.heuristic import AEL, SHISO, Drain, Spell
from repro.baselines.partition import IPLoM, LenMa, LogClusterLin, LogMine
from repro.baselines.search import LogSig, MoLFI
from repro.baselines.semantic import lilac, logppt, uniparser

#: Syntax-based baselines (no ground truth needed).
BASELINES: dict[str, Callable[[], Baseline]] = {
    "AEL": AEL,
    "Drain": Drain,
    "IPLoM": IPLoM,
    "LenMa": LenMa,
    "LFA": LFA,
    "LogCluster": LogClusterLin,
    "LogMine": LogMine,
    "Logram": Logram,
    "LogSig": LogSig,
    "MoLFI": MoLFI,
    "SHISO": SHISO,
    "SLCT": SLCT,
    "Spell": Spell,
}

#: Simulated semantic baselines (require ``bind(gt_ids)``, DESIGN.md §3.2).
SEMANTIC_BASELINES: dict[str, Callable[[], Baseline]] = {
    "UniParser": uniparser,
    "LogPPT": logppt,
    "LILAC": lilac,
}


def make_baseline(name: str, **kw) -> Baseline:
    if name in BASELINES:
        return BASELINES[name](**kw)
    if name in SEMANTIC_BASELINES:
        return SEMANTIC_BASELINES[name](**kw)
    raise KeyError(f"unknown baseline {name!r}")
