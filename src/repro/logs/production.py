"""Synthetic production topics for the Table-5 reproduction.

The paper's Table 5 reports, per Volcano Engine TLS topic, the incoming
log volume (MB/s), trained model size and training time. User logs are
proprietary, so we substitute per-scenario synthetic generators
(DESIGN.md §3.3) and reinterpret "log volume" as the measured matching
throughput in MB/s — the rate at which the trained model can keep up
with ingestion, which is the quantity the paper's column demonstrates.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.logs.synthgen import make_bank, render_corpus

_PATHS = [f"/api/v1/{p}" for p in ("users", "orders", "items", "search", "login", "health")]
_AGENTS = ["curl/8.1", "Mozilla/5.0", "Go-http-client/1.1", "python-requests/2.31"]


def _web_access(n_logs: int, rng: np.random.Generator) -> list[str]:
    """Apache combined-format access lines."""
    out = []
    methods = ["GET", "GET", "GET", "POST", "PUT", "DELETE"]
    statuses = ["200", "200", "200", "204", "301", "404", "500"]
    for _ in range(n_logs):
        ip = ".".join(str(int(x)) for x in rng.integers(1, 255, 4))
        d, h, m, s = int(rng.integers(1, 28)), *map(int, rng.integers(0, 60, 3))
        path = _PATHS[int(rng.integers(0, len(_PATHS)))]
        if rng.random() < 0.5:
            path += f"/{int(rng.integers(0, 10_000))}"
        out.append(
            f'{ip} - - [2024-07-{d:02d} {h % 24:02d}:{m:02d}:{s:02d}] '
            f'"{methods[int(rng.integers(0, len(methods)))]} {path} HTTP/1.1" '
            f"{statuses[int(rng.integers(0, len(statuses)))]} {int(rng.integers(100, 60_000))} "
            f'"{_AGENTS[int(rng.integers(0, len(_AGENTS)))]}"'
        )
    return out


#: topic name -> (generator style, bank template count or None, avg pool scale)
PRODUCTION_TOPICS: dict[str, dict] = {
    "text-stream": {"style": "bank", "n_templates": 180, "pool_scale": 1.0},
    "web-access-high": {"style": "web"},
    "web-access-low": {"style": "web"},
    "go-http-api": {"style": "bank", "n_templates": 90, "pool_scale": 0.8},
    "go-search": {"style": "bank", "n_templates": 120, "pool_scale": 1.2},
}


def production_corpus(topic: str, *, target_mb: float = 8.0, seed: int = 0) -> pd.DataFrame:
    """Render ~``target_mb`` MiB of messages for a production topic."""
    spec = PRODUCTION_TOPICS[topic]
    rng = np.random.default_rng((seed, 0x9807, len(topic)))
    target = int(target_mb * (1 << 20))
    if spec["style"] == "web":
        # Access lines average ~95 bytes.
        msgs = _web_access(max(100, target // 95), rng)
    else:
        bank = make_bank(
            f"prod-{topic}", spec["n_templates"], seed=seed, pool_scale=spec["pool_scale"]
        )
        probe = render_corpus(bank, 2000, seed=seed)
        avg = max(10.0, probe["message"].str.len().mean())
        msgs = render_corpus(bank, max(100, int(target / avg)), seed=seed)["message"].tolist()
    return pd.DataFrame(
        {"log_id": np.arange(len(msgs), dtype=np.int64), "message": msgs}
    )
