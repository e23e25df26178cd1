"""End-to-end sequential pipeline: train, match, query, ablations."""
import pytest

from repro.core import ParserConfig, match_sequential, train_model_sequential
from repro.core.config import ClusterConfig
from repro.eval.ga import grouping_accuracy
from repro.logs import loghub_lite

SET1 = [f"UserService createUser token abc{i} success" for i in range(5)]
SET2 = [
    "UserService createUser token abc123 success",
    "UserService deleteUser token xyz789 failed",
    "UserService queryUser token def456 success",
]


class TestTrain:
    def test_set1_single_template(self):
        model = train_model_sequential(SET1)
        assert len(model.nodes) == 1
        assert model.nodes[0].text() == "UserService createUser token * success"

    def test_set2_tree(self):
        model = train_model_sequential(SET2)
        assert model.nodes[0].parent == -1
        assert len(model.nodes) >= 4  # root + (eventually) 3 singletons

    def test_empty_messages_skipped(self):
        model = train_model_sequential(["", "  ", "a b"])
        assert len(model.nodes) == 1

    def test_lengths_grouped_separately(self):
        model = train_model_sequential(["a b", "a b c", "a b c d"])
        assert len({nd.group_key for nd in model.nodes}) == 3

    def test_prefix_grouping(self):
        cfg = ParserConfig(prefix_k=1)
        model = train_model_sequential(["alpha x1 y", "beta x2 y"], cfg)
        assert len({nd.group_key for nd in model.nodes}) == 2

    def test_counts_accumulate(self):
        model = train_model_sequential(SET1 * 3)
        assert model.nodes[0].n_logs == 15

    def test_deterministic(self):
        pdf, _ = loghub_lite("Zookeeper")
        msgs = pdf["message"].tolist()
        a = train_model_sequential(msgs)
        b = train_model_sequential(msgs)
        assert [(n.parent, n.template, n.saturation) for n in a.nodes] == [
            (n.parent, n.template, n.saturation) for n in b.nodes
        ]


class TestMatch:
    def test_training_logs_match(self):
        model = train_model_sequential(SET1 + SET2)
        nids = match_sequential(SET1 + SET2, model, add_unmatched=False)
        assert all(n >= 0 for n in nids)

    def test_unseen_variable_value_matches(self):
        model = train_model_sequential(SET1)
        nids = match_sequential(["UserService createUser token NEW999 success"], model)
        assert nids[0] == 0

    def test_unmatched_becomes_temp_template(self):
        model = train_model_sequential(SET1)
        before = len(model.nodes)
        nids = match_sequential(["totally different log line here"], model)
        assert len(model.nodes) == before + 1
        assert nids[0] == before
        # A second occurrence now matches the temp template.
        nids2 = match_sequential(["totally different log line here"], model)
        assert nids2[0] == before

    def test_threshold_coarsens(self):
        model = train_model_sequential(SET2)
        fine = match_sequential(SET2, model, threshold=None)
        coarse = match_sequential(SET2, model, threshold=0.01)
        assert len(set(coarse)) <= len(set(fine))
        assert len(set(coarse)) == 1  # everything rolls up to the root

    def test_ga_on_dataset(self):
        pdf, _ = loghub_lite("HDFS")
        cfg = ParserConfig()
        model = train_model_sequential(pdf["message"].tolist(), cfg)
        nids = match_sequential(pdf["message"].tolist(), model, cfg, threshold=cfg.query_threshold)
        assert grouping_accuracy(nids, pdf["template_id"].tolist()) > 0.8


class TestNaiveMatchAblation:
    def test_naive_assignment_populated(self):
        cfg = ParserConfig(naive_match=True)
        model = train_model_sequential(SET2, cfg)
        assert len(model.train_assignment) == 3

    def test_naive_vs_text_match_close(self):
        """§5.4.1: text matching ≈ training assignment (GA within 5%)."""
        pdf, _ = loghub_lite("Zookeeper")
        msgs = pdf["message"].tolist()
        gt = pdf["template_id"].tolist()
        cfg_n = ParserConfig(naive_match=True)
        m_n = train_model_sequential(msgs, cfg_n)
        ga_naive = grouping_accuracy(
            match_sequential(msgs, m_n, cfg_n, threshold=0.8), gt
        )
        cfg_t = ParserConfig()
        m_t = train_model_sequential(msgs, cfg_t)
        ga_text = grouping_accuracy(
            match_sequential(msgs, m_t, cfg_t, threshold=0.8), gt
        )
        assert abs(ga_naive - ga_text) < 0.05


class TestDedupAblation:
    def test_no_dedup_same_templates(self):
        cfg = ParserConfig(dedup=False)
        model = train_model_sequential(SET1, cfg)
        texts = {nd.text() for nd in model.nodes}
        assert "UserService createUser token * success" in texts

    def test_no_dedup_counts(self):
        cfg = ParserConfig(dedup=False)
        model = train_model_sequential(SET1 * 2, cfg)
        assert model.nodes[0].n_logs == 10


class TestSamplingGuard:
    def test_max_unique_per_group(self):
        cfg = ParserConfig(max_unique_per_group=10)
        msgs = [f"svc op val{i}" for i in range(50)]
        model = train_model_sequential(msgs, cfg)
        # Only the 10 most frequent unique logs were clustered.
        assert model.nodes[0].n_logs <= 50
        assert all(len(nd.template) == 3 for nd in model.nodes)
