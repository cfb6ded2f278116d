"""Name-similarity utilities and Jaro string similarity tests."""
import pytest

from repro.baselines.jaro import jaro, max_jaro
from repro.discovery.names import (name_similarity, name_tokens, qgram_jaccard,
                                   qgrams, token_overlap_sim)


class TestQgrams:
    def test_identical(self):
        assert qgram_jaccard("drug_id", "drug_id") == 1.0

    def test_disjoint(self):
        assert qgram_jaccard("abc", "xyz") == 0.0

    def test_underscores_normalized(self):
        assert qgram_jaccard("drug_id", "drug id") == 1.0

    def test_case_insensitive(self):
        assert qgram_jaccard("Drug_ID", "drug_id") == 1.0

    def test_similar_names_high(self):
        assert qgram_jaccard("school_name", "school_names") > 0.6

    def test_short_string(self):
        assert qgrams("ab") == {"#ab", "ab#"}
        assert qgrams("a") == {"#a#"}

    def test_symmetric(self):
        assert qgram_jaccard("road_ref", "road_id") == \
            qgram_jaccard("road_id", "road_ref")


class TestTokenOverlap:
    def test_shared_token(self):
        # one of two tokens shared, min-normalized
        assert token_overlap_sim("drug_id", "drug_ref") == 0.5
        assert token_overlap_sim("drug", "drug_ref") == 1.0

    def test_no_shared(self):
        assert token_overlap_sim("drug_id", "city_code") == 0.0

    def test_name_tokens(self):
        assert name_tokens("drug_id") == {"drug", "id"}

    def test_empty(self):
        assert token_overlap_sim("", "drug") == 0.0

    def test_combined_similarity(self):
        assert name_similarity("compound_ref", "compound_id") >= 0.5


class TestJaro:
    @pytest.mark.parametrize("a,b,expected", [
        ("martha", "marhta", 0.9444),
        ("dixon", "dicksonx", 0.7667),
        ("jellyfish", "smellyfish", 0.8963),
    ])
    def test_known_values(self, a, b, expected):
        assert jaro(a, b) == pytest.approx(expected, abs=1e-3)

    def test_identical(self):
        assert jaro("abc", "abc") == 1.0

    def test_empty(self):
        assert jaro("", "abc") == 0.0

    def test_no_matches(self):
        assert jaro("abc", "xyz") == 0.0

    def test_symmetric(self):
        assert jaro("drug00042", "drug00024") == jaro("drug00024", "drug00042")

    def test_max_jaro(self):
        assert max_jaro("drug0001", ["drug0001", "city0001"]) == 1.0
        assert max_jaro("x", []) == 0.0
