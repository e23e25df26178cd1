"""Shared scaffolding for baseline parsers."""
from __future__ import annotations

import time
from abc import ABC, abstractmethod

from repro.core.tokenizer import preprocess_message


class BudgetExceeded(Exception):
    """Raised when a parser exceeds its wall-clock budget — the
    reproduction's analogue of the paper's "failed to finish" entries."""


def unique_token_lists(
    messages: list[str],
) -> tuple[list[tuple[str, ...]], list[int], list[int]]:
    """Preprocess + deduplicate.

    Returns (unique token tuples, duplicate count per unique, index per
    message). Baselines are deterministic per token sequence, so running
    them on unique sequences — with duplicate counts preserved for the
    frequency-based ones — is equivalent to the original stream and
    keeps the quadratic algorithms tractable (DESIGN.md §6).
    """
    uniq: dict[tuple[str, ...], int] = {}
    counts: list[int] = []
    inv: list[int] = []
    out: list[tuple[str, ...]] = []
    for msg in messages:
        toks = tuple(preprocess_message(msg))
        idx = uniq.get(toks)
        if idx is None:
            idx = len(out)
            uniq[toks] = idx
            out.append(toks)
            counts.append(0)
        counts[idx] += 1
        inv.append(idx)
    return out, counts, inv


class Baseline(ABC):
    """A baseline parser: messages -> cluster id per message.

    ``dedup`` is False by default: the published baselines process every
    log (deduplication is one of ByteBrain's contributions, §4.1.3), so
    charging them per-log keeps the efficiency comparison honest. The
    only exception is LogMine, whose level-0 *is* exact-duplicate
    clustering in the published algorithm.
    """

    name: str = "baseline"
    dedup: bool = False

    _deadline: float | None = None

    @abstractmethod
    def parse_unique(self, uniq: list[tuple[str, ...]], counts: list[int]) -> list:
        """Cluster id per (unique) token sequence."""

    def check_budget(self) -> None:
        """Cooperative budget check for the inner loops of slow parsers."""
        if self._deadline is not None and time.perf_counter() > self._deadline:
            raise BudgetExceeded(self.name)

    def parse(self, messages: list[str], budget_s: float | None = None) -> list:
        self._deadline = None if budget_s is None else time.perf_counter() + budget_s
        if self.dedup:
            uniq, counts, inv = unique_token_lists(messages)
            labels = self.parse_unique(uniq, counts)
            return [labels[i] for i in inv]
        toks = [tuple(preprocess_message(m)) for m in messages]
        return self.parse_unique(toks, [1] * len(toks))
