"""Unit tests for the NLP preprocessing substrate (repro.text)."""
import pytest

from repro.text.lexicon import FUNCTION_WORDS, STOPWORDS, is_function_word
from repro.text.tokenizer import is_nounlike, lemmatize, normalize, tokenize


class TestTokenize:
    def test_lowercases(self):
        assert tokenize("Drug Interaction") == ["drug", "interaction"]

    def test_drops_punctuation(self):
        assert tokenize("enzyme, (target)!") == ["enzyme", "target"]

    def test_keeps_identifiers_with_digits(self):
        assert tokenize("drug00042 binds") == ["drug00042", "binds"]

    def test_drops_pure_numbers(self):
        assert tokenize("42 7.5 drug") == ["drug"]

    def test_keeps_underscored_tokens(self):
        assert tokenize("drug_id value") == ["drug_id", "value"]

    def test_empty_string(self):
        assert tokenize("") == []

    def test_whitespace_only(self):
        assert tokenize("   \t\n ") == []

    def test_token_must_start_with_letter(self):
        # the leading digit is not part of a token; the alphabetic tail is
        assert tokenize("1abc abc1") == ["abc", "abc1"]


class TestLemmatize:
    @pytest.mark.parametrize("word,lemma", [
        ("drugs", "drug"),
        ("enzymes", "enzyme"),
        ("studies", "study"),
        ("boxes", "box"),
        ("classes", "class"),
        ("running", "run"),
        ("binding", "bind"),
        ("tested", "test"),
        ("cities", "city"),
        ("gas", "gas"),
    ])
    def test_suffix_rules(self, word, lemma):
        assert lemmatize(word) == lemma

    @pytest.mark.parametrize("word", ["drug00042", "drug_id", "x1s"])
    def test_identifiers_untouched(self, word):
        assert lemmatize(word) == word

    @pytest.mark.parametrize("word", ["is", "as", "us", "ss"])
    def test_short_words_untouched(self, word):
        assert lemmatize(word) == word

    def test_double_consonant_stripped(self):
        assert lemmatize("stopped") == "stop"

    def test_idempotent_on_lemmas(self):
        for w in ["drug", "enzyme", "city", "run"]:
            assert lemmatize(lemmatize(w)) == lemmatize(w)


class TestNounFilter:
    def test_stopwords_are_function_words(self):
        assert is_function_word("the")
        assert is_function_word("and")

    def test_verbs_are_function_words(self):
        assert is_function_word("showed")
        assert is_function_word("increased")

    def test_domain_terms_are_nounlike(self):
        assert is_nounlike("enzyme")
        assert is_nounlike("drug00042")

    def test_lexicons_disjoint_enough(self):
        # the two lexicons serve different filters but may not shadow
        # common nouns
        assert "drug" not in STOPWORDS
        assert "drug" not in FUNCTION_WORDS


class TestNormalize:
    def test_full_pipeline(self):
        toks = normalize("The drugs showed significant binding to enzymes")
        assert "drug" in toks
        assert "enzyme" in toks
        assert "the" not in toks
        assert "showed" not in toks
        assert "significant" not in toks

    def test_no_noun_filter(self):
        toks = normalize("the drug", noun_filter=False)
        assert "the" in toks and "drug" in toks

    def test_no_lemma(self):
        toks = normalize("drugs", lemma=False)
        assert toks == ["drugs"]

    def test_multiset_semantics(self):
        assert normalize("drug drug drug") == ["drug"] * 3

    def test_deterministic(self):
        text = "Enzyme inhibitors reduced drug00042 activity in trials"
        assert normalize(text) == normalize(text)
