"""The trained parser model: template tree, matching index, queries.

The model stores only node metadata (template text, saturation,
parent/child links, counts) — exactly what the paper keeps in its
internal topic (§3) — so it is small and JSON-serializable. Online
matching (§4.8) never recomputes distances: logs are matched against
template texts in descending saturation order, with an inverted index
on the most discriminative token position per length bucket so each log
only inspects a handful of candidate templates.
"""
from __future__ import annotations

import hashlib
import json
from dataclasses import dataclass, field

import numpy as np

WILDCARD = "*"
_SEP = "\x1f"


def token_hash64(token: str) -> int:
    """Deterministic 64-bit token hash for the matching index and the
    pure-Python training path (the Spark path uses Catalyst's
    ``xxhash64``; the two never need to agree because templates are
    exchanged as text — see DESIGN.md §6)."""
    return int.from_bytes(hashlib.blake2b(token.encode("utf-8"), digest_size=8).digest(), "big", signed=True)


def hash_tokens(tokens) -> np.ndarray:
    return np.array([token_hash64(t) for t in tokens], dtype=np.int64)


@dataclass
class TemplateNode:
    """One clustering-tree node (a template at some precision level)."""

    nid: int
    parent: int  # -1 when the node is a group root / temporary template
    template: tuple[str, ...]
    saturation: float
    n_logs: int
    depth: int
    group_key: str

    def text(self) -> str:
        return " ".join(self.template)


class _LengthBucket:
    """Matching index for all templates of one token count.

    Templates are ordered by descending saturation (deepest-first
    tie-break), and keyed by the token at the most discriminative
    position ``p*`` — any template matching a log either agrees with the
    log at ``p*`` or holds a wildcard there, so the candidate set
    ``index[log[p*]] ∪ wild_rows`` is exact, not approximate.
    """

    def __init__(self, nodes: list[TemplateNode]):
        order = sorted(range(len(nodes)), key=lambda i: (-nodes[i].saturation, -nodes[i].depth))
        self.nids = np.array([nodes[i].nid for i in order], dtype=np.int64)
        tmpls = [nodes[i].template for i in order]
        t, m = len(tmpls), len(tmpls[0])
        self.wild = np.array([[tok == WILDCARD for tok in tp] for tp in tmpls], dtype=bool)
        self.hashes = np.array([[token_hash64(tok) for tok in tp] for tp in tmpls], dtype=np.int64)
        # Pick p*: minimize expected candidates = #wild + #nonwild/#distinct.
        best, best_cost = 0, float("inf")
        for p in range(m):
            nz = ~self.wild[:, p]
            distinct = len(set(self.hashes[nz, p])) if nz.any() else 0
            cost = (~nz).sum() + ((nz.sum() / distinct) if distinct else 0.0)
            if cost < best_cost:
                best, best_cost = p, cost
        self.pstar = best
        self.wild_rows = np.flatnonzero(self.wild[:, best])
        self.index: dict[int, np.ndarray] = {}
        nonwild = np.flatnonzero(~self.wild[:, best])
        by_val: dict[int, list[int]] = {}
        for r in nonwild:
            by_val.setdefault(int(self.hashes[r, best]), []).append(int(r))
        self.index = {v: np.array(rs, dtype=np.int64) for v, rs in by_val.items()}

    def match(self, hashes: np.ndarray) -> int:
        """First matching template's nid in saturation order, or -1."""
        cand = self.index.get(int(hashes[self.pstar]))
        if cand is None:
            cand = self.wild_rows
        elif len(self.wild_rows):
            cand = np.sort(np.concatenate([cand, self.wild_rows]))  # row id == sat rank
        if not len(cand):
            return -1
        ok = ((self.hashes[cand] == hashes) | self.wild[cand]).all(axis=1)
        hit = np.flatnonzero(ok)
        return int(self.nids[cand[hit[0]]]) if len(hit) else -1


class ParserModel:
    """Trained ByteBrain model: nodes + lazy matching index."""

    def __init__(self, nodes: list[TemplateNode] | None = None):
        self.nodes: list[TemplateNode] = nodes or []
        self._buckets: dict[int, _LengthBucket] | None = None
        #: optional training assignment for the "naive match" ablation:
        #: exact token sequence -> nid of the clustering-tree node.
        self.train_assignment: dict[str, int] = {}

    # -- construction -------------------------------------------------
    def add_node(self, **kw) -> TemplateNode:
        node = TemplateNode(nid=len(self.nodes), **kw)
        self.nodes.append(node)
        self._buckets = None
        return node

    def add_temp_template(self, tokens: tuple[str, ...], group_key: str = "temp") -> TemplateNode:
        """Insert an unmatched log as a temporary singleton template
        (§3, online matching) so subsequent logs of its kind match."""
        return self.add_node(
            parent=-1, template=tuple(tokens), saturation=1.0,
            n_logs=1, depth=0, group_key=group_key,
        )

    # -- matching (§4.8) ----------------------------------------------
    def _ensure_index(self) -> dict[int, _LengthBucket]:
        if self._buckets is None:
            by_len: dict[int, list[TemplateNode]] = {}
            for nd in self.nodes:
                by_len.setdefault(len(nd.template), []).append(nd)
            self._buckets = {m: _LengthBucket(nds) for m, nds in by_len.items()}
        return self._buckets

    def match_tokens(self, tokens: tuple[str, ...]) -> int:
        """nid of the most precise matching template, or -1."""
        bucket = self._ensure_index().get(len(tokens))
        if bucket is None:
            return -1
        return bucket.match(hash_tokens(tokens))

    # -- query-time precision control (§3 Query) ----------------------
    def ancestor_at(self, nid: int, threshold: float) -> int:
        """Coarsest ancestor whose saturation still meets ``threshold``
        (the matched node itself when even it falls below)."""
        cur = nid
        while True:
            parent = self.nodes[cur].parent
            if parent < 0 or self.nodes[parent].saturation < threshold:
                return cur
            cur = parent

    def templates_at(self, threshold: float) -> list[TemplateNode]:
        """All maximal nodes with saturation >= threshold — the template
        set a user sees at one slider position (Table 4)."""
        out = []
        for nd in self.nodes:
            if nd.saturation >= threshold and (
                nd.parent < 0 or self.nodes[nd.parent].saturation < threshold
            ):
                out.append(nd)
        return out

    # -- persistence & size (§5.4.4, Table 5) -------------------------
    def to_json(self) -> str:
        return json.dumps(
            {
                "nodes": [
                    [nd.parent, _SEP.join(nd.template), round(nd.saturation, 6),
                     nd.n_logs, nd.depth, nd.group_key]
                    for nd in self.nodes
                ]
            }
        )

    @classmethod
    def from_json(cls, blob: str) -> "ParserModel":
        model = cls()
        for parent, tmpl, sat, n_logs, depth, gk in json.loads(blob)["nodes"]:
            model.add_node(
                parent=parent, template=tuple(tmpl.split(_SEP)), saturation=sat,
                n_logs=n_logs, depth=depth, group_key=gk,
            )
        return model

    @property
    def nbytes(self) -> int:
        return len(self.to_json().encode("utf-8"))

    # -- periodic-retrain merge (§3 Offline Training) ------------------
    def merge_from(self, newer: "ParserModel", sim_threshold: float = 0.8) -> dict[int, int]:
        """Merge a newly trained model into this one.

        Nodes whose (group, parent, template) similarity — fraction of
        positions that agree exactly — reaches ``sim_threshold`` are
        merged (counts added); others are attached as new child nodes,
        as described in §3. Returns the nid mapping newer→self.
        """
        by_parent: dict[tuple[str, int], list[TemplateNode]] = {}
        for nd in self.nodes:
            by_parent.setdefault((nd.group_key, nd.parent), []).append(nd)
        mapping: dict[int, int] = {}
        for nd in sorted(newer.nodes, key=lambda x: x.depth):
            parent_here = mapping.get(nd.parent, -1) if nd.parent >= 0 else -1
            best, best_sim = None, 0.0
            for cand in by_parent.get((nd.group_key, parent_here), []):
                if len(cand.template) != len(nd.template):
                    continue
                agree = sum(a == b for a, b in zip(cand.template, nd.template))
                sim = agree / len(nd.template)
                if sim > best_sim:
                    best, best_sim = cand, sim
            if best is not None and best_sim >= sim_threshold:
                best.n_logs += nd.n_logs
                best.saturation = max(best.saturation, nd.saturation)
                mapping[nd.nid] = best.nid
            else:
                new = self.add_node(
                    parent=parent_here, template=nd.template, saturation=nd.saturation,
                    n_logs=nd.n_logs, depth=nd.depth, group_key=nd.group_key,
                )
                by_parent.setdefault((nd.group_key, parent_here), []).append(new)
                mapping[nd.nid] = new.nid
        self._buckets = None
        return mapping
