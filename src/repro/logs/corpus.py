"""LogHub / LogHub-2.0 dataset registries and lite-scale corpora.

Template counts come straight from the paper's Table 1. Log counts for
the "-lite" variants: LogHub keeps the paper's 2,000 logs per dataset;
LogHub-2.0-lite scales by ``sqrt(paper_logs) * 30`` clamped to
[4,000, 40,000] — this preserves the relative dataset ordering (HDFS /
Thunderbird / Spark largest) while keeping a 17-method single-node
sweep tractable (DESIGN.md §3.1).
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.logs.synthgen import TemplateBank, make_bank, render_corpus

#: LogHub (Table 1, left): dataset -> ground-truth template count.
LOGHUB: dict[str, int] = {
    "HealthApp": 75,
    "OpenStack": 43,
    "OpenSSH": 27,
    "Proxifier": 8,
    "HPC": 46,
    "Zookeeper": 50,
    "Mac": 341,
    "Hadoop": 114,
    "Linux": 118,
    "Android": 166,
    "HDFS": 14,
    "BGL": 120,
    "Windows": 50,
    "Apache": 6,
    "Thunderbird": 149,
    "Spark": 36,
}

#: LogHub-2.0 (Table 1, right): dataset -> (paper log count, template count).
LOGHUB2: dict[str, tuple[int, int]] = {
    "HealthApp": (212_394, 156),
    "OpenStack": (207_632, 48),
    "OpenSSH": (638_947, 38),
    "Proxifier": (21_320, 11),
    "HPC": (429_988, 74),
    "Zookeeper": (74_273, 89),
    "Mac": (100_314, 626),
    "Hadoop": (179_993, 236),
    "Linux": (23_921, 338),
    "HDFS": (11_167_740, 46),
    "BGL": (4_631_261, 320),
    "Apache": (51_978, 29),
    "Thunderbird": (16_601_745, 1241),
    "Spark": (16_075_117, 236),
}


def loghub2_lite_size(name: str, scale: float = 1.0) -> int:
    """Lite log count for a LogHub-2.0 dataset (sqrt-scaled, clamped)."""
    paper_n, _ = LOGHUB2[name]
    n = int(math.sqrt(paper_n) * 30 * scale)
    return max(1000, min(40_000, max(4_000, n) if scale >= 1.0 else n))


def loghub_lite(name: str, *, n_logs: int = 2000, seed: int = 0) -> tuple[pd.DataFrame, TemplateBank]:
    """LogHub-lite corpus: 2,000 labelled logs as in the paper."""
    bank = make_bank(name, LOGHUB[name], seed=seed, pool_scale=0.6)
    return render_corpus(bank, n_logs, seed=seed), bank


def loghub2_lite(
    name: str, *, scale: float = 1.0, seed: int = 0
) -> tuple[pd.DataFrame, TemplateBank]:
    """LogHub-2.0-lite corpus: sqrt-scaled log count, Table-1 templates."""
    _, n_templates = LOGHUB2[name]
    bank = make_bank(name + "-2.0", n_templates, seed=seed, pool_scale=1.0)
    return render_corpus(bank, loghub2_lite_size(name, scale), seed=seed), bank


def to_spark(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Corpus pandas frame -> Spark DataFrame (log_id, message, template_id)."""
    return spark.createDataFrame(pdf)


def corpus_stats(pdf: pd.DataFrame) -> dict:
    """Table-1-style statistics for a rendered corpus."""
    size_bytes = int(pdf["message"].str.len().sum()) + len(pdf)  # + newlines
    return {
        "n_logs": int(len(pdf)),
        "size_bytes": size_bytes,
        "n_templates": int(pdf["template_id"].nunique()),
    }
