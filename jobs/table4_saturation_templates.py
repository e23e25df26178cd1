"""Table 4 — Templates at varying saturation thresholds.

Trains on Android wakelock-style logs and prints the template set the
query layer returns at the paper's thresholds (0.05 / 0.78 / 0.9 /
0.95): low thresholds collapse everything to one wildcarded skeleton,
higher thresholds progressively pin ``release``/``acquire``,
``flg``/``flags`` and process names — the paper's adaptability demo.
"""
from __future__ import annotations

import sys

from repro.core import ParserConfig, train_model_sequential
from repro.logs.android import android_lock_logs

THRESHOLDS = (0.05, 0.78, 0.9, 0.95)


def run(spark=None, n_logs: int = 2000, thresholds=THRESHOLDS) -> dict[float, list[str]]:
    """threshold -> template texts (most logs first)."""
    pdf = android_lock_logs(n_logs)
    model = train_model_sequential(pdf["message"].tolist(), ParserConfig())
    out = {}
    for t in thresholds:
        nodes = sorted(model.templates_at(t), key=lambda nd: -nd.n_logs)
        out[t] = [nd.text() for nd in nodes]
    return out


def main() -> None:
    for t, templates in run().items():
        print(f"\n=== saturation threshold {t} ({len(templates)} templates)")
        for text in templates[:12]:
            print("   ", text)
        if len(templates) > 12:
            print(f"    ... {len(templates) - 12} more")


if __name__ == "__main__":
    sys.path.insert(0, __file__.rsplit("/", 1)[0])
    main()
