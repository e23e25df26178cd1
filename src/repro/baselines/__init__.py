"""Baseline log parsers (§5.1.2).

Compact, faithful reimplementations of the thirteen syntax-based
baselines the paper benchmarks with the Logparser toolkit, plus
simulated stand-ins for the three semantic baselines (UniParser,
LogPPT, LILAC) that require GPUs / hosted LLMs (DESIGN.md §3.2).

Every parser implements ``parse(messages) -> list[cluster_id]`` over
the shared preprocessing (common-variable replacement + Listing-1
tokenization), mirroring the per-dataset regex preprocessing the
toolkit applies before each algorithm.
"""

from repro.baselines.base import Baseline, unique_token_lists
from repro.baselines.registry import BASELINES, SEMANTIC_BASELINES, make_baseline

__all__ = [
    "Baseline",
    "unique_token_lists",
    "BASELINES",
    "SEMANTIC_BASELINES",
    "make_baseline",
]
