"""Property-based tests (hypothesis) for the pure-algorithm substrates."""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.jaro import jaro
from repro.discovery.names import qgram_jaccard
from repro.sketch.minhash import MinHasher, est_containment, est_jaccard
from repro.text.tokenizer import lemmatize, normalize, tokenize

_words = st.text(alphabet="abcdefghijklmnopqrstuvwxyz0123456789_ ", max_size=60)
_tokens = st.text(alphabet="abcdefghijklmnopqrstuvwxyz", min_size=1, max_size=15)
_HASHER = MinHasher(n_hashes=64, seed=1)


@settings(max_examples=40, deadline=None)
@given(_words)
def test_tokenize_outputs_valid_tokens(text):
    for t in tokenize(text):
        assert t and t[0].isalpha()
        assert t == t.lower()


@settings(max_examples=40, deadline=None)
@given(_tokens)
def test_lemmatize_idempotent(word):
    once = lemmatize(word)
    assert lemmatize(once) == once or len(lemmatize(once)) <= len(once)


@settings(max_examples=40, deadline=None)
@given(_words)
def test_normalize_subset_of_tokens(text):
    toks = set(tokenize(text))
    kept = set(normalize(text, lemma=False))
    assert kept <= toks


@settings(max_examples=30, deadline=None)
@given(st.lists(_tokens, min_size=1, max_size=30),
       st.lists(_tokens, min_size=1, max_size=30))
def test_minhash_estimates_bounded(a, b):
    sa, sb = _HASHER.signature_of(a), _HASHER.signature_of(b)
    j = est_jaccard(sa, sb)
    assert 0.0 <= j <= 1.0
    c = est_containment(sa, len(set(a)), sb, len(set(b)))
    assert 0.0 <= c <= 1.0


@settings(max_examples=30, deadline=None)
@given(st.lists(_tokens, min_size=1, max_size=30))
def test_minhash_self_identity(a):
    s = _HASHER.signature_of(a)
    assert est_jaccard(s, s) == 1.0


@settings(max_examples=40, deadline=None)
@given(_tokens, _tokens)
def test_jaro_bounds_and_symmetry(a, b):
    v = jaro(a, b)
    assert 0.0 <= v <= 1.0
    assert v == jaro(b, a)
    assert jaro(a, a) == 1.0


@settings(max_examples=40, deadline=None)
@given(_tokens, _tokens)
def test_qgram_jaccard_bounds_and_symmetry(a, b):
    v = qgram_jaccard(a, b)
    assert 0.0 <= v <= 1.0
    assert v == qgram_jaccard(b, a)
