"""Entity-matching baseline tests (SpaCy/SciSpaCy stand-ins, §6.1)."""
import numpy as np
import pytest

from repro.baselines.entity_matching import (extract_entities, match_score,
                                             rank_tables)


class TestExtraction:
    def test_generic_long_tokens(self):
        ents = extract_entities("the drug00042 binds strongly", mode="generic")
        assert "drug00042" in ents
        assert "the" not in ents
        assert "binds" not in ents  # length < 6

    def test_generic_is_noisy(self):
        ents = extract_entities("commonplace wording without entities",
                                mode="generic")
        assert len(ents) >= 2  # generic mode over-extracts — by design

    def test_tuned_uses_lexicon(self):
        lex = {"aspirin"}
        ents = extract_entities("aspirin reduced commonplace wording",
                                mode="tuned", lexicon=lex)
        assert ents == {"aspirin"}

    def test_tuned_shape_fallback(self):
        ents = extract_entities("drug00042 text", mode="tuned", lexicon=set())
        assert "drug00042" in ents  # alphanumeric-id shape

    def test_tuned_requires_lexicon(self):
        with pytest.raises(ValueError):
            extract_entities("x", mode="tuned")

    def test_unknown_mode(self):
        with pytest.raises(ValueError):
            extract_entities("x", mode="bogus")


class TestMatchScore:
    vals = np.array(["drug00001", "drug00002", "drug00003"])

    def test_jaccard(self):
        s = match_score({"drug00001", "other"}, self.vals, metric="jaccard")
        assert s == pytest.approx(1 / 4)

    def test_jaro_exact(self):
        s = match_score({"drug00001"}, self.vals, metric="jaro")
        assert s == pytest.approx(1.0)

    def test_jaro_near_miss_below_threshold(self):
        s = match_score({"zzzzz"}, self.vals, metric="jaro")
        assert s == 0.0

    def test_empty_entities(self):
        assert match_score(set(), self.vals) == 0.0

    def test_empty_values(self):
        assert match_score({"a"}, np.array([])) == 0.0


class TestRankTables:
    def test_aggregates_to_best_column(self):
        col_values = {"t1.a": np.array(["drug00001", "drug00002"]),
                      "t1.b": np.array(["x1", "x2"]),
                      "t2.c": np.array(["city0001"])}
        col_table = {"t1.a": "t1", "t1.b": "t1", "t2.c": "t2"}
        ranked = rank_tables("report on drug00001 and drug00002",
                             col_values, col_table, mode="generic",
                             metric="jaccard")
        assert ranked and ranked[0][0] == "t1"

    def test_zero_scores_dropped(self):
        col_values = {"t.a": np.array(["zzz"])}
        ranked = rank_tables("nothing matches here at all",
                             col_values, {"t.a": "t"}, mode="generic",
                             metric="jaccard")
        assert ranked == []

    def test_tuned_mode_more_precise_on_pharma(self, pharma):
        """Domain-tuned extraction (SciSpaCy analog) must beat generic
        extraction for a pharma doc citing drug names."""
        doc = pharma.docs.iloc[0]
        cols = ["drugs.drug_name", "drugs.drug_id"]
        sv = pharma.string_values
        col_values = {c: sv.loc[sv["col_id"] == c, "value"].to_numpy()
                      for c in cols}
        col_table = {c: "drugs" for c in cols}
        lex = set(pharma.vocab_topics)
        tuned = rank_tables(doc["text"], col_values, col_table,
                            mode="tuned", metric="jaccard", lexicon=lex)
        generic = rank_tables(doc["text"], col_values, col_table,
                              mode="generic", metric="jaccard")
        t_score = dict(tuned).get("drugs", 0.0)
        g_score = dict(generic).get("drugs", 0.0)
        assert t_score >= g_score
