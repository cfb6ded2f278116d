"""Tokenization, noun-filter heuristic, and rule-based lemmatization.

These are the scalar building blocks of the document-transformation
pipeline (paper §3). ``repro.text.bow`` applies them at scale with Spark;
this module keeps them as pure, deterministic Python functions so they
can be unit-tested and reused on the query path (a discovery query is a
single short document).
"""
from __future__ import annotations

import re

from repro.text.lexicon import is_function_word

_TOKEN_RE = re.compile(r"[a-z][a-z0-9_]*")

_VOWELS = set("aeiou")


def tokenize(text: str) -> list[str]:
    """Lowercase ``text`` and return alphanumeric word tokens.

    Tokens start with a letter; pure numbers and punctuation are dropped
    (the paper retains only noun terms, and numerals are never nouns).
    """
    return _TOKEN_RE.findall(text.lower())


def lemmatize(token: str) -> str:
    """Rule-based lemmatizer: strip common English inflection suffixes.

    Handles plural ``-s``/``-es``/``-ies`` and verbal ``-ing``/``-ed``
    with conservative guards so identifiers like ``drug_0042`` or short
    words are never mangled. A full WordNet lemmatizer is unavailable
    offline; these rules cover the inflections our corpora contain.
    """
    if "_" in token or any(ch.isdigit() for ch in token):
        return token  # identifier-like tokens are already canonical
    if len(token) > 4 and token.endswith("ies"):
        return token[:-3] + "y"
    if len(token) > 4 and token.endswith("sses"):
        return token[:-2]
    if len(token) > 3 and token.endswith("es") and token[-3] in "sxz":
        return token[:-2]
    if len(token) > 3 and token.endswith("s") and not token.endswith("ss"):
        return token[:-1]
    if len(token) > 5 and token.endswith("ing") and _has_vowel(token[:-3]):
        return _strip_doubled(token[:-3])
    if len(token) > 4 and token.endswith("ed") and _has_vowel(token[:-2]):
        return _strip_doubled(token[:-2])
    return token


def _strip_doubled(stem: str) -> str:
    # "running" -> "runn" -> "run"; leaves single consonants alone.
    if len(stem) >= 3 and stem[-1] == stem[-2] and stem[-1] not in _VOWELS:
        return stem[:-1]
    return stem


def _has_vowel(s: str) -> bool:
    return any(ch in _VOWELS for ch in s)


def is_nounlike(token: str) -> bool:
    """Noun-filter heuristic: keep tokens not in the function-word lexicons."""
    return not is_function_word(token)


def normalize(text: str, *, noun_filter: bool = True, lemma: bool = True) -> list[str]:
    """Full preprocessing for one text: tokenize → POS filter → lemmatize.

    Returns the token multiset (a list with repetitions) so downstream
    code can choose bag-of-words counts or distinct sets.
    """
    toks = tokenize(text)
    if noun_filter:
        toks = [t for t in toks if is_nounlike(t)]
    if lemma:
        toks = [lemmatize(t) for t in toks]
    return toks
