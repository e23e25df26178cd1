"""Table-4/Table-5 input generators."""
import pytest

from repro.core.tokenizer import preprocess_message
from repro.logs.android import android_lock_logs
from repro.logs.production import PRODUCTION_TOPICS, production_corpus


class TestAndroid:
    def test_deterministic(self):
        assert android_lock_logs(200).equals(android_lock_logs(200))

    def test_structure(self):
        pdf = android_lock_logs(200)
        for m in pdf["message"].head(50):
            toks = preprocess_message(m)
            assert toks[1] == "lock" and "tag" in toks and "name" in toks

    def test_flagword_correlates_with_action(self):
        pdf = android_lock_logs(300)
        for m in pdf["message"]:
            assert (" flg " in m) == m.startswith("release")
            assert (" flags " in m) == m.startswith("acquire")

    def test_android_ws_null(self):
        pdf = android_lock_logs(300)
        for m in pdf["message"]:
            if " name android " in m:
                assert " ws null " in m


class TestProduction:
    @pytest.mark.parametrize("topic", list(PRODUCTION_TOPICS))
    def test_volume_close_to_target(self, topic):
        pdf = production_corpus(topic, target_mb=0.3)
        mb = pdf["message"].str.len().sum() / (1 << 20)
        assert 0.1 < mb < 0.9

    def test_deterministic(self):
        a = production_corpus("go-search", target_mb=0.2)
        b = production_corpus("go-search", target_mb=0.2)
        assert a.equals(b)

    def test_web_access_format(self):
        pdf = production_corpus("web-access-low", target_mb=0.1)
        assert pdf["message"].str.contains("HTTP/1.1").all()
