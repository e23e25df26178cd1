"""Tokenization (§4.1.1) and common-variable replacement (§4.1.2)."""
import pytest

from repro.core.tokenizer import (
    COMMON_VARIABLE_PATTERNS,
    TOKENIZE_PATTERN,
    WILDCARD,
    preprocess_message,
    replace_variables,
    tokenize,
)


class TestTokenize:
    def test_simple_whitespace(self):
        assert tokenize("a b c") == ["a", "b", "c"]

    def test_multiple_delimiters_collapse(self):
        assert tokenize("a,,  b;;c") == ["a", "b", "c"]

    @pytest.mark.parametrize("delim", list(",;=()[]{}?@&<>:") + ["\t", "\n", "\r"])
    def test_each_delimiter(self, delim):
        assert tokenize(f"a{delim}b") == ["a", "b"]

    def test_url_protocol_separator(self):
        assert tokenize("http://host/path") == ["http", "host/path"]

    def test_sentence_period_split(self):
        assert tokenize("done. next") == ["done", "next"]

    def test_trailing_period_stripped(self):
        assert tokenize("connection closed.") == ["connection", "closed"]

    def test_period_in_number_preserved(self):
        assert tokenize("v1.2.3 ok") == ["v1.2.3", "ok"]

    def test_period_in_domain_preserved(self):
        assert tokenize("host.example.com up") == ["host.example.com", "up"]

    def test_quotes_are_delimiters(self):
        assert tokenize('say "hello" now') == ["say", "hello", "now"]

    def test_escaped_quote(self):
        assert tokenize(r"a\"b") == ["a", "b"]

    def test_empty_string(self):
        assert tokenize("") == []

    def test_only_delimiters(self):
        assert tokenize(" ,;= ") == []

    def test_key_value_split(self):
        assert tokenize("pid=1234 uid=99") == ["pid", "1234", "uid", "99"]

    def test_slash_not_delimiter(self):
        assert tokenize("/var/log/app.log ok") == ["/var/log/app.log", "ok"]

    def test_dash_not_delimiter(self):
        assert tokenize("blk_-123-x ok") == ["blk_-123-x", "ok"]


class TestReplaceVariables:
    def test_iso_timestamp(self):
        assert replace_variables("at 2024-07-01 12:30:45 done") == f"at {WILDCARD} done"

    def test_timestamp_with_millis(self):
        assert replace_variables("t 2024-07-01T12:30:45.123 e") == f"t {WILDCARD} e"

    def test_ipv4(self):
        assert replace_variables("from 10.0.3.44 closed") == f"from {WILDCARD} closed"

    def test_ipv4_with_port(self):
        assert replace_variables("to 10.0.3.44:8080 ok") == f"to {WILDCARD} ok"

    def test_uuid(self):
        u = "123e4567-e89b-42d3-a456-426614174000"
        assert replace_variables(f"id {u} ok") == f"id {WILDCARD} ok"

    def test_md5(self):
        assert replace_variables("h " + "a1" * 16 + " ok") == f"h {WILDCARD} ok"

    def test_hex_literal(self):
        assert replace_variables("addr 0xDEADbeef end") == f"addr {WILDCARD} end"

    def test_plain_words_untouched(self):
        s = "service started on node alpha"
        assert replace_variables(s) == s

    def test_custom_patterns(self):
        assert replace_variables("user u123", (r"u\d+",)) == f"user {WILDCARD}"

    def test_all_defaults_compile(self):
        import re

        for p in COMMON_VARIABLE_PATTERNS:
            re.compile(p)


class TestPreprocess:
    def test_pipeline_order(self):
        # Replacement happens before tokenization: the timestamp's inner
        # space must not split it into two tokens.
        toks = preprocess_message("x 2024-07-01 12:30:45 y")
        assert toks == ["x", WILDCARD, "y"]

    def test_replace_off(self):
        toks = preprocess_message("from 10.0.3.44 closed", replace=False)
        assert toks == ["from", "10.0.3.44", "closed"]


class TestSparkParity:
    """The exact same pattern must behave identically under Java regex."""

    @pytest.fixture(scope="class")
    def messages(self):
        return [
            "UserService createUser token=abc123 success",
            "at 2024-07-01 12:30:45 from 10.1.2.3:443 done.",
            'say "hello" now; path /var/log/x.log {a} [b] <c>',
            "http://example.com/x?y=1&z=2",
            "trailing period. and, commas",
        ]

    def test_tokenize_parity(self, spark, messages):
        import pandas as pd
        from pyspark.sql import functions as F

        from repro.core.tokenizer import spark_replace_variables, spark_tokenize

        df = spark.createDataFrame(pd.DataFrame({"m": messages}))
        got = (
            df.select(spark_tokenize(spark_replace_variables(F.col("m"))).alias("t"))
            .toPandas()["t"]
            .tolist()
        )
        want = [preprocess_message(m) for m in messages]
        assert [list(x) for x in got] == want
