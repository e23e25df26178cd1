"""Synthetic log corpus substrate.

The paper evaluates on the public LogHub / LogHub-2.0 corpora, which are
not available offline. This package generates deterministic synthetic
stand-ins with ground-truth template labels (see DESIGN.md §3.1): per
dataset we build a template bank with the paper's Table-1 template count
and render logs with Zipf template frequencies, bounded variable-value
pools (high duplication, as in the paper's Fig. 4), shared-prefix
template families and replaced-variable fields (timestamps, IPs, UUIDs).
"""

from repro.logs.synthgen import LogTemplate, Slot, TemplateBank, make_bank, render_corpus
from repro.logs.corpus import (
    LOGHUB,
    LOGHUB2,
    loghub2_lite,
    loghub2_lite_size,
    loghub_lite,
    corpus_stats,
)

__all__ = [
    "LogTemplate",
    "Slot",
    "TemplateBank",
    "make_bank",
    "render_corpus",
    "LOGHUB",
    "LOGHUB2",
    "loghub_lite",
    "loghub2_lite",
    "loghub2_lite_size",
    "corpus_stats",
]
