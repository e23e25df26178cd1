"""Template-bank log generator with ground-truth labels.

A *template* is a fixed-length sequence of parts; each part is either a
constant word or a variable :class:`Slot`. Slots come in two families:

* pooled (``id``, ``num``, ``cat``, ``path``) — values drawn from a
  bounded per-template pool, which produces the high log duplication the
  paper exploits with deduplication (Fig. 4);
* replaced (``ip``, ``ts``, ``uuid``, ``hex``) — rendered as realistic
  raw values that ByteBrain's common-variable replacement (§4.1.2)
  rewrites to the wildcard token before tokenization.

Banks are collision-free by construction: no two templates share the
same (length, constant-skeleton) signature, constant words and pool
values are drawn from disjoint vocabularies, and pooled values embed the
template id — so a rendered message always maps to exactly one
ground-truth template.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np
import pandas as pd


def _stable_seed(name: str) -> int:
    """Process-stable 32-bit seed for a dataset name (``hash(str)`` is
    randomized per interpreter, so it must not feed the RNG)."""
    return zlib.crc32(name.encode("utf-8"))

#: Slot kinds whose rendered values are rewritten to ``*`` by the
#: common-variable-replacement preprocessing step.
REPLACED_KINDS = ("ip", "ts", "uuid", "hex")
#: Slot kinds rendered from a bounded per-template value pool.
POOLED_KINDS = ("id", "num", "cat", "word", "path")

_SYLLABLES = [
    "ser", "vice", "con", "nect", "au", "then", "tok", "reg", "ward", "sched",
    "ul", "net", "work", "stor", "age", "ind", "ex", "quer", "block", "node",
    "mon", "itor", "dis", "patch", "rout", "er", "buf", "fer", "sync", "meta",
    "repl", "ica", "lease", "shard", "top", "ic", "worker", "pool", "chan",
]

_VERBS = [
    "started", "stopped", "received", "sent", "created", "deleted", "updated",
    "opened", "closed", "failed", "completed", "registered", "released",
    "acquired", "allocated", "refreshed", "expired", "scheduled", "retried",
    "flushed", "loaded", "committed", "aborted", "accepted", "rejected",
]


def _word(rng: np.random.Generator) -> str:
    """One pronounceable lowercase constant word."""
    k = int(rng.integers(2, 4))
    return "".join(rng.choice(_SYLLABLES) for _ in range(k))


def _distinct_words(rng: np.random.Generator, n: int, suffix: str = "") -> list[str]:
    """``n`` distinct words; ``suffix`` keeps vocabularies disjoint."""
    seen: dict[str, None] = {}
    while len(seen) < n:
        seen.setdefault(_word(rng) + suffix, None)
    return list(seen)


@dataclass(frozen=True)
class Slot:
    """A variable position in a template."""

    kind: str  # one of REPLACED_KINDS + POOLED_KINDS
    pool: tuple[str, ...] = ()  # empty for replaced kinds

    def render(self, rng: np.random.Generator) -> str:
        if self.kind in POOLED_KINDS:
            return self.pool[int(rng.integers(0, len(self.pool)))]
        if self.kind == "ip":
            a, b, c, d = rng.integers(1, 255, 4)
            return f"{a}.{b}.{c}.{d}"
        if self.kind == "ts":
            d, h, m, s = rng.integers(1, 28), *rng.integers(0, 60, 3)
            return f"2024-07-{d:02d} {h % 24:02d}:{m:02d}:{s:02d}"
        if self.kind == "uuid":
            h = rng.integers(0, 16, 32)
            x = "".join("0123456789abcdef"[v] for v in h)
            return f"{x[:8]}-{x[8:12]}-{x[12:16]}-{x[16:20]}-{x[20:]}"
        if self.kind == "hex":
            return f"0x{int(rng.integers(0, 2**31)):08x}"
        raise ValueError(f"unknown slot kind {self.kind!r}")


@dataclass(frozen=True)
class LogTemplate:
    """One ground-truth template: constants interleaved with slots."""

    tid: int
    parts: tuple  # tuple of ("c", word) | ("v", Slot)

    @property
    def length(self) -> int:
        return len(self.parts)

    def gt_tokens(self) -> tuple[str, ...]:
        """Ground-truth token sequence after variable replacement:
        constants verbatim, every slot as the wildcard ``*``."""
        return tuple(p[1] if p[0] == "c" else "*" for p in self.parts)

    def gt_text(self) -> str:
        return " ".join(self.gt_tokens())

    def render(self, rng: np.random.Generator) -> str:
        out = []
        for kind, val in self.parts:
            out.append(val if kind == "c" else val.render(rng))
        return " ".join(out)

    def skeleton(self) -> tuple:
        """Collision signature: (length, ((pos, const_word), ...))."""
        consts = tuple((i, p[1]) for i, p in enumerate(self.parts) if p[0] == "c")
        return (len(self.parts), consts)


@dataclass(frozen=True)
class TemplateBank:
    """A bank of templates plus their Zipf sampling weights."""

    name: str
    templates: tuple[LogTemplate, ...]
    weights: np.ndarray  # sums to 1, aligned with templates

    @property
    def n_templates(self) -> int:
        return len(self.templates)

    def gt_text(self, tid: int) -> str:
        return self.templates[tid].gt_text()


# Slot-kind sampling distribution for non-prefix positions that become
# variables: mostly pooled ids/numbers, some replaced fields, few small
# categorical pools (the paper's "register callback for None" ambiguity).
_KINDS = ["id", "num", "cat", "word", "path", "ip", "ts", "uuid", "hex"]
_KIND_P = [0.24, 0.16, 0.14, 0.14, 0.07, 0.08, 0.07, 0.05, 0.05]


def _make_slot(
    rng: np.random.Generator, tid: int, value_vocab: list[str], pool_scale: float
) -> Slot:
    kind = rng.choice(_KINDS, p=_KIND_P)
    if kind == "id":
        n = max(2, int(rng.integers(20, 200) * pool_scale))
        stem = value_vocab[int(rng.integers(0, len(value_vocab)))]
        # "n" separator, not "x": "-0x17" would look like a hex literal
        # to the common-variable-replacement regexes.
        return Slot("id", tuple(f"{stem}-{tid}n{j}" for j in range(n)))
    if kind == "num":
        n = max(2, int(rng.integers(10, 120) * pool_scale))
        base = int(rng.integers(0, 90000))
        return Slot("num", tuple(str(base + j) for j in range(n)))
    if kind == "cat":
        n = int(rng.integers(2, 6))
        vals = rng.choice(value_vocab, size=n, replace=False)
        return Slot("cat", tuple(str(v) for v in vals))
    if kind == "word":
        # High-cardinality name-like variable (usernames, hostnames).
        # Two thirds are purely alphabetic, one third carries a digit —
        # the mix that defeats digit-based dynamic-token heuristics
        # (same template, inconsistent abstraction).
        n = max(4, int(rng.integers(15, 120) * pool_scale))
        stem = value_vocab[int(rng.integers(0, len(value_vocab)))]
        vowels = "aeiouy"
        vals = []
        for j in range(n):
            alpha = vowels[j % 6] + chr(97 + (j * 7) % 26) + vowels[(j // 6) % 6] + chr(98 + (j // 36) % 24)
            vals.append(f"{stem}{j}" if j % 3 == 0 else f"{stem}{alpha}")
        return Slot("word", tuple(vals))
    if kind == "path":
        n = max(2, int(rng.integers(5, 40) * pool_scale))
        stem = value_vocab[int(rng.integers(0, len(value_vocab)))]
        return Slot("path", tuple(f"/var/{stem}/{tid}/part{j}" for j in range(n)))
    return Slot(str(kind))


def make_bank(
    name: str,
    n_templates: int,
    *,
    seed: int = 0,
    zipf_alpha: float = 1.3,
    pool_scale: float = 1.0,
) -> TemplateBank:
    """Build a deterministic bank of ``n_templates`` distinct templates.

    Templates are organised into shared-prefix families (1–5 members) so
    that initial grouping and clustering are genuinely exercised.
    ``pool_scale`` scales pooled-slot pool sizes (larger corpora use
    larger pools so the unique-log count grows with volume).
    """
    rng = np.random.default_rng((seed, _stable_seed(name)))
    const_vocab = _distinct_words(rng, max(60, n_templates), "")
    value_vocab = _distinct_words(rng, max(60, n_templates), "v")

    templates: list[LogTemplate] = []
    skeletons: set = set()
    guard = 0
    while len(templates) < n_templates and guard < 100 * n_templates + 1000:
        guard += 1
        fam = int(rng.integers(1, 6))
        plen = int(rng.integers(1, 4))
        prefix = [("c", str(w)) for w in rng.choice(const_vocab, size=plen)]
        length = int(rng.integers(plen + 3, plen + 12))
        for _ in range(fam):
            if len(templates) >= n_templates:
                break
            tid = len(templates)
            parts: list = list(prefix)
            n_slots = 0
            # Real templates are mostly constant text: cap variable
            # slots well below the token count so no template
            # degenerates into an all-wildcard line.
            max_slots = min(4, max(1, (length - 2) // 3))
            for _pos in range(plen, length):
                if n_slots < max_slots and rng.random() < 0.25:
                    parts.append(("v", _make_slot(rng, tid, value_vocab, pool_scale)))
                    n_slots += 1
                elif rng.random() < 0.25:
                    parts.append(("c", str(rng.choice(_VERBS))))
                else:
                    parts.append(("c", str(rng.choice(const_vocab))))
            t = LogTemplate(tid, tuple(parts))
            if t.skeleton() in skeletons:
                continue  # regenerate — identical constant skeleton
            skeletons.add(t.skeleton())
            templates.append(t)
    if len(templates) < n_templates:  # pragma: no cover — guard exhausted
        raise RuntimeError(f"could not build {n_templates} distinct templates")

    ranks = rng.permutation(n_templates) + 1
    w = 1.0 / ranks**zipf_alpha
    return TemplateBank(name, tuple(templates), w / w.sum())


def render_corpus(bank: TemplateBank, n_logs: int, *, seed: int = 0) -> pd.DataFrame:
    """Render ``n_logs`` messages from ``bank``.

    Returns a pandas frame with ``log_id``, ``message`` and the
    ground-truth ``template_id`` — deterministic in ``seed``.
    """
    rng = np.random.default_rng((seed, 7, _stable_seed(bank.name)))
    tids = rng.choice(bank.n_templates, size=n_logs, p=bank.weights)
    messages = [bank.templates[t].render(rng) for t in tids]
    return pd.DataFrame(
        {
            "log_id": np.arange(n_logs, dtype=np.int64),
            "message": messages,
            "template_id": tids.astype(np.int64),
        }
    )
