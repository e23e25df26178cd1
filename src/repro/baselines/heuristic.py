"""Heuristic rule-based baselines: Drain, Spell, AEL, SHISO.

Each class is a compact reimplementation of the published algorithm's
core mechanism (fixed-depth prefix tree, streaming LCS, bin-and-
reconcile, incremental similarity tree); toolkit-level knobs keep their
published defaults.
"""
from __future__ import annotations

import re

from repro.baselines.base import Baseline

_DIGIT = re.compile(r"\d")
WILD = "<*>"


def _has_digit(tok: str) -> bool:
    return bool(_DIGIT.search(tok))


def _seq_sim(a: tuple, b: tuple) -> float:
    """Drain's simSeq: fraction of positions with exactly equal tokens
    (template wildcards do NOT count, as in the toolkit)."""
    same = sum(1 for x, y in zip(a, b) if x == y and x != WILD)
    return same / max(len(a), 1)


def _merge(a: tuple, b: tuple) -> tuple:
    return tuple(x if x == y else WILD for x, y in zip(a, b))


class Drain(Baseline):
    """Drain (He et al., ICWS'17): fixed-depth parse tree.

    Logs route through a depth-``depth`` prefix tree keyed by token
    count then leading tokens (digit-bearing tokens collapse to a
    wildcard branch); at the leaf, the log joins the group with maximal
    position-wise similarity >= ``st`` or founds a new group.
    """

    name = "Drain"

    def __init__(self, depth: int = 4, st: float = 0.4, max_children: int = 100):
        self.depth, self.st, self.max_children = depth, st, max_children

    def parse_unique(self, uniq, counts):
        tree: dict = {}
        groups: list[tuple] = []  # group template per group id
        labels = []
        for toks in uniq:
            node = tree.setdefault(len(toks), {})
            for tok in toks[: self.depth - 2]:
                key = WILD if _has_digit(tok) else tok
                if key not in node and len(node) >= self.max_children:
                    key = WILD
                node = node.setdefault(key, {})
            leaf = node.setdefault("$groups", [])
            best, best_sim = -1, -1.0
            for gid in leaf:
                sim = _seq_sim(groups[gid], toks)
                if sim > best_sim:
                    best, best_sim = gid, sim
            if best >= 0 and best_sim >= self.st:
                groups[best] = _merge(groups[best], toks)
                labels.append(best)
            else:
                gid = len(groups)
                groups.append(tuple(toks))
                leaf.append(gid)
                labels.append(gid)
        return labels


class Spell(Baseline):
    """Spell (Du & Li, ICDM'16): streaming LCS-based template mining.

    Each log joins the existing template whose longest common
    subsequence covers more than ``tau`` of the log, refining the
    template to the LCS; otherwise it founds a new template.
    """

    name = "Spell"

    def __init__(self, tau: float = 0.5):
        self.tau = tau

    @staticmethod
    def _lcs(a: tuple, b: tuple) -> int:
        # Classic O(|a||b|) DP on the shorter dimension.
        prev = [0] * (len(b) + 1)
        for x in a:
            cur = [0]
            for j, y in enumerate(b, 1):
                cur.append(prev[j - 1] + 1 if x == y else max(prev[j], cur[-1]))
            prev = cur
        return prev[-1]

    def parse_unique(self, uniq, counts):
        templates: list[tuple] = []
        token_sets: list[set] = []
        labels = []
        for toks in uniq:
            self.check_budget()
            ts = set(toks)
            best, best_len = -1, 0
            for gid, tmpl in enumerate(templates):
                # Cheap upper bound prunes most LCS computations.
                if len(token_sets[gid] & ts) <= best_len:
                    continue
                l = self._lcs(tuple(t for t in tmpl if t != WILD), toks)
                if l > best_len:
                    best, best_len = gid, l
            if best >= 0 and best_len > self.tau * len(toks):
                kept = [t for t in templates[best] if t != WILD]
                templates[best] = tuple(t if t in toks else WILD for t in kept)
                token_sets[best] = set(templates[best]) - {WILD}
                labels.append(best)
            else:
                templates.append(tuple(toks))
                token_sets.append(ts)
                labels.append(len(templates) - 1)
        return labels


class AEL(Baseline):
    """AEL (Jiang et al., QSIC'08): abstract, bin, reconcile.

    Digit-bearing tokens are abstracted to wildcards; logs are binned by
    (token count, wildcard count) and grouped by their constant
    skeleton; reconciliation merges groups differing at one position.
    """

    name = "AEL"

    def parse_unique(self, uniq, counts):
        sigs = [tuple(WILD if _has_digit(t) else t for t in toks) for toks in uniq]
        by_sig: dict[tuple, int] = {}
        labels = [by_sig.setdefault(s, len(by_sig)) for s in sigs]
        # Reconcile: within (len, #wild) bins, merge signatures that
        # differ at exactly one non-wildcard position.
        sig_list = list(by_sig)
        bins: dict[tuple, list[int]] = {}
        for gid, s in enumerate(sig_list):
            bins.setdefault((len(s), sum(t == WILD for t in s)), []).append(gid)
        parent = list(range(len(sig_list)))

        def find(x):
            while parent[x] != x:
                parent[x] = parent[parent[x]]
                x = parent[x]
            return x

        for ids in bins.values():
            for i, a in enumerate(ids):
                for b in ids[i + 1:]:
                    sa, sb = sig_list[a], sig_list[b]
                    if sum(x != y for x, y in zip(sa, sb)) == 1:
                        parent[find(a)] = find(b)
        return [find(l) for l in labels]


class SHISO(Baseline):
    """SHISO (Mizutani, SCC'13): incremental tree with character-class
    similarity. Tokens are summarized as (alpha, digit, symbol) count
    vectors; a log joins a child whose template distance is below
    ``threshold``, else becomes a new child (breadth-capped).
    """

    name = "SHISO"

    def __init__(self, threshold: float = 0.22, max_children: int = 60):
        self.threshold, self.max_children = threshold, max_children

    @staticmethod
    def _vec(tok: str) -> tuple:
        a = sum(c.isalpha() for c in tok)
        d = sum(c.isdigit() for c in tok)
        return (a, d, len(tok) - a - d)

    def _dist(self, a: tuple, b: tuple) -> float:
        if len(a) != len(b):
            return 1.0
        tot = 0.0
        for x, y in zip(a, b):
            if x == y:
                continue
            va, vb = self._vec(x), self._vec(y)
            denom = sum(va) + sum(vb) or 1
            tot += sum(abs(p - q) for p, q in zip(va, vb)) / denom
        return tot / max(len(a), 1)

    def parse_unique(self, uniq, counts):
        groups: list[tuple] = []
        children: dict[int, list[int]] = {-1: []}
        labels = []
        for toks in uniq:
            self.check_budget()
            node = -1
            placed = None
            while placed is None:
                best, best_d = -1, 1.0
                for gid in children.get(node, []):
                    d = self._dist(groups[gid], toks)
                    if d < best_d:
                        best, best_d = gid, d
                if best >= 0 and best_d <= self.threshold:
                    groups[best] = _merge(groups[best], toks)
                    placed = best
                elif len(children.get(node, [])) < self.max_children:
                    gid = len(groups)
                    groups.append(tuple(toks))
                    children.setdefault(node, []).append(gid)
                    children[gid] = []
                    placed = gid
                else:
                    # Descend into the nearest child and retry there.
                    node = best if best >= 0 else children[node][0]
            labels.append(placed)
        return labels
