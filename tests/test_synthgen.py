"""Synthetic corpus substrate (DESIGN.md §3.1)."""
import numpy as np
import pytest

from repro.core.tokenizer import preprocess_message
from repro.logs import (
    LOGHUB,
    LOGHUB2,
    corpus_stats,
    loghub2_lite,
    loghub2_lite_size,
    loghub_lite,
    make_bank,
    render_corpus,
)
from repro.logs.synthgen import POOLED_KINDS, REPLACED_KINDS, Slot


class TestBank:
    def test_template_count(self):
        bank = make_bank("x", 40)
        assert bank.n_templates == 40

    def test_deterministic(self):
        a, b = make_bank("x", 25), make_bank("x", 25)
        assert [t.parts for t in a.templates] == [t.parts for t in b.templates]

    def test_different_names_differ(self):
        a, b = make_bank("x", 25), make_bank("y", 25)
        assert [t.gt_text() for t in a.templates] != [t.gt_text() for t in b.templates]

    def test_skeletons_unique(self):
        bank = make_bank("x", 120)
        skels = [t.skeleton() for t in bank.templates]
        assert len(set(skels)) == len(skels)

    def test_weights_normalized(self):
        bank = make_bank("x", 30)
        assert abs(bank.weights.sum() - 1.0) < 1e-9

    def test_gt_tokens_wildcard_slots(self):
        bank = make_bank("x", 10)
        for t in bank.templates:
            for part, gt in zip(t.parts, t.gt_tokens()):
                assert (gt == "*") == (part[0] == "v")

    def test_slot_kinds_known(self):
        bank = make_bank("x", 60)
        for t in bank.templates:
            for kind, val in t.parts:
                if kind == "v":
                    assert val.kind in POOLED_KINDS + REPLACED_KINDS


class TestSlots:
    @pytest.mark.parametrize("kind", REPLACED_KINDS)
    def test_replaced_kinds_are_replaced(self, kind):
        rng = np.random.default_rng(0)
        s = Slot(kind)
        for _ in range(20):
            # Rendered value reduces to the wildcard token after the
            # common-variable replacement + tokenization pipeline.
            toks = preprocess_message(f"a {s.render(rng)} b")
            assert toks[0] == "a" and toks[-1] == "b"
            assert all(t == "*" for t in toks[1:-1]), toks

    def test_pooled_values_stay_single_token(self):
        bank = make_bank("x", 40)
        rng = np.random.default_rng(1)
        for t in bank.templates:
            for kind, val in t.parts:
                if kind == "v" and val.kind in POOLED_KINDS:
                    assert len(preprocess_message(val.render(rng))) == 1


class TestCorpus:
    def test_render_deterministic(self):
        bank = make_bank("x", 20)
        assert render_corpus(bank, 500).equals(render_corpus(bank, 500))

    def test_gt_alignment(self):
        """Each message token-matches its ground-truth template."""
        bank = make_bank("x", 30)
        pdf = render_corpus(bank, 300)
        for _, row in pdf.head(100).iterrows():
            gt = bank.templates[row.template_id].gt_tokens()
            toks = preprocess_message(row.message)
            assert len(toks) == len(gt)
            assert all(g == "*" or g == t for g, t in zip(gt, toks))

    def test_no_cross_template_collision(self):
        bank = make_bank("x", 30)
        pdf = render_corpus(bank, 2000)
        # After preprocessing, one token sequence maps to one gt id.
        seen = {}
        for _, row in pdf.iterrows():
            key = tuple(preprocess_message(row.message))
            assert seen.setdefault(key, row.template_id) == row.template_id

    @pytest.mark.parametrize("name,bound", [("Thunderbird", 0.75), ("BGL", 0.5)])
    def test_zipf_duplication(self, name, bound):
        """Bounded pools produce substantial duplication on the large
        corpora (paper Fig. 4) — the bigger the stream, the higher the
        duplicate fraction."""
        pdf, _ = loghub2_lite(name)
        assert pdf["message"].nunique() < bound * len(pdf)


class TestRegistries:
    def test_loghub_has_16_datasets(self):
        assert len(LOGHUB) == 16

    def test_loghub2_has_14_datasets(self):
        assert len(LOGHUB2) == 14
        assert "Android" not in LOGHUB2 and "Windows" not in LOGHUB2

    @pytest.mark.parametrize("name", ["HDFS", "Proxifier"])
    def test_loghub_lite_shapes(self, name):
        pdf, bank = loghub_lite(name)
        assert len(pdf) == 2000
        assert bank.n_templates == LOGHUB[name]
        st = corpus_stats(pdf)
        assert st["n_templates"] <= bank.n_templates

    def test_loghub2_sizes_ordered(self):
        # Biggest paper datasets stay biggest in the lite scale.
        assert loghub2_lite_size("Thunderbird") >= loghub2_lite_size("Zookeeper")
        assert loghub2_lite_size("HDFS") >= loghub2_lite_size("Proxifier")
        for n in LOGHUB2:
            assert 4000 <= loghub2_lite_size(n) <= 40_000

    def test_loghub2_lite_template_count(self):
        pdf, bank = loghub2_lite("Proxifier")
        assert bank.n_templates == LOGHUB2["Proxifier"][1]
