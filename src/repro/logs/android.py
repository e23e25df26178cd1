"""Android wakelock-style logs for the Table-4 reproduction.

The paper's Table 4 shows templates extracted from Android PowerManager
logs at saturation thresholds 0.05 / 0.78 / 0.9 / 0.95: at low
thresholds everything but the skeleton is a wildcard; higher thresholds
progressively pin ``release``/``acquire``, ``flg``/``flags`` and
process names like ``android``/``audioserver``. This generator renders
messages with exactly that correlational structure.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

_PROCS = ["android", "audioserver", "system_server", "bluetooth"]
_TAGS = ["AudioMix", "AlarmManager", "ActivityManager", "job/com.app.sync", "GpsLocation"]


def android_lock_logs(n_logs: int = 2000, *, seed: int = 0) -> pd.DataFrame:
    """Render ``n_logs`` wakelock messages.

    Structure (15 tokens): ``<action> lock <id> <flagword> <flagval> tag
    <tag> name <proc> ws <ws> uid <uid> pid <pid>`` where ``flagword`` is
    ``flg`` for release and ``flags`` for acquire (as in the paper's
    Table 4) and ``ws`` is ``null`` for the ``android`` process.
    """
    rng = np.random.default_rng((seed, 0xA11D))
    # Skewed process mix (audioserver dominates the non-android share),
    # as in real PowerManager logs — the skew is what makes saturation
    # keep splitting until process names are pinned (paper's 0.95 row).
    proc_p = [0.45, 0.38, 0.12, 0.05]
    rows = []
    for i in range(n_logs):
        action = "release" if rng.random() < 0.55 else "acquire"
        flagword = "flg" if action == "release" else "flags"
        proc = str(rng.choice(_PROCS, p=proc_p))
        ws = "null" if proc == "android" else f"WorkSource{{{int(rng.integers(1000, 20000))}}}"
        msg = (
            f"{action} lock {int(rng.integers(1, 1 << 30)):x} {flagword} "
            f"0x{int(rng.integers(0, 64)):x} tag {_TAGS[int(rng.integers(0, len(_TAGS)))]} "
            f"name {proc} ws {ws} uid {int(rng.integers(1000, 12000))} "
            f"pid {int(rng.integers(100, 32000))}"
        )
        rows.append(msg)
    return pd.DataFrame({"log_id": np.arange(n_logs, dtype=np.int64), "message": rows})
