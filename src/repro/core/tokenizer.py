"""Tokenization (§4.1.1) and common-variable replacement (§4.1.2).

The Listing-1 regular expression is kept in a form valid for both
Python ``re`` and Java regex, so the exact same pattern drives the
pure-Python path (``re.split``) and the Spark path (``F.split``) —
the two paths produce identical token sequences (tested).
"""
from __future__ import annotations

import re

from pyspark.sql import Column
from pyspark.sql import functions as F

#: Listing 1, with the sentence-period group made non-capturing (a
#: capturing group would leak the delimiter into ``re.split`` output).
TOKENIZE_PATTERN = (
    r"(?:://)|(?:(?:[\s'\";=()\[\]{}?@&<>:\n\t\r,])|(?:[.](?:\s+|$))|(?:\\[\"']))+"
)
_TOKENIZE_RE = re.compile(TOKENIZE_PATTERN)

#: The wildcard token: replaced common variables render to it during
#: preprocessing and template variable positions store it.
WILDCARD = "*"

#: Default common-variable patterns (§4.1.2): timestamps, IPs, MD5
#: hashes, UUIDs, hex literals. Order matters — timestamps before bare
#: dates/times, UUID before MD5 (both are hex runs).
COMMON_VARIABLE_PATTERNS: tuple[str, ...] = (
    r"\d{4}-\d{2}-\d{2}[ T]\d{2}:\d{2}:\d{2}(?:[.,]\d+)?",  # ISO timestamp
    r"\d{4}/\d{2}/\d{2} \d{2}:\d{2}:\d{2}",  # slash timestamp
    r"\d{1,3}\.\d{1,3}\.\d{1,3}\.\d{1,3}(?::\d{1,5})?",  # IPv4[:port]
    r"\b[0-9a-f]{8}-[0-9a-f]{4}-[0-9a-f]{4}-[0-9a-f]{4}-[0-9a-f]{12}\b",  # UUID
    r"\b[0-9a-f]{32}\b",  # MD5
    r"\b0x[0-9a-fA-F]+\b",  # hex literal
)
_COMMON_VARIABLE_RES = [re.compile(p) for p in COMMON_VARIABLE_PATTERNS]


def replace_variables(message: str, patterns: tuple[str, ...] | None = None) -> str:
    """Rewrite known-variable substrings to the wildcard token."""
    res = _COMMON_VARIABLE_RES if patterns is None else [re.compile(p) for p in patterns]
    for r in res:
        message = r.sub(WILDCARD, message)
    return message


def tokenize(message: str) -> list[str]:
    """Split one log record into tokens with the Listing-1 regex."""
    return [t for t in _TOKENIZE_RE.split(message) if t]


def preprocess_message(message: str, *, replace: bool = True) -> list[str]:
    """Python-path preprocessing: variable replacement then tokenization."""
    if replace:
        message = replace_variables(message)
    return tokenize(message)


def spark_replace_variables(col: Column, patterns: tuple[str, ...] | None = None) -> Column:
    """Catalyst chain of ``regexp_replace`` for the common variables."""
    for p in patterns if patterns is not None else COMMON_VARIABLE_PATTERNS:
        # Java regexp_replace treats the replacement as a template;
        # a literal "*" needs no escaping there.
        col = F.regexp_replace(col, p, WILDCARD)
    return col


def spark_tokenize(col: Column) -> Column:
    """Catalyst tokenization: split + drop empty tokens."""
    return F.filter(F.split(col, TOKENIZE_PATTERN), lambda t: t != F.lit(""))
