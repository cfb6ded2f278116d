"""Profiler tests: tagging heuristics, sketch completeness, oracle checks."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.embed.wordvec import DIM
from repro.oracle import assert_equivalent
from repro.sketch.profiler import (KEY_CARDINALITY, MIN_DISTINCT_FRAC, Profile,
                                   _tags_for)


class TestTagging:
    def _row(self, **kw):
        base = {"dtype": "str", "n_values": 100, "n_distinct": 100,
                "distinct_ratio": 1.0, "avg_len": 9.0}
        base.update(kw)
        return pd.Series(base)

    def test_unique_text_column(self):
        tags = _tags_for(self._row())
        assert {"text-search", "pkfk", "key-candidate"} <= tags

    def test_categorical_excluded_from_text_search(self):
        tags = _tags_for(self._row(n_distinct=4, distinct_ratio=0.04))
        assert "text-search" not in tags

    def test_long_text_excluded_from_pkfk(self):
        tags = _tags_for(self._row(avg_len=80.0))
        assert "pkfk" not in tags
        assert "text-search" in tags

    def test_non_key_fk_column(self):
        tags = _tags_for(self._row(n_values=200, n_distinct=100,
                                   distinct_ratio=0.5))
        assert "pkfk" in tags and "key-candidate" not in tags

    def test_numeric_column(self):
        tags = _tags_for(self._row(dtype="num"))
        assert tags == {"numeric", "pkfk", "key-candidate"}

    def test_date_column_untagged(self):
        assert _tags_for(self._row(dtype="date")) == frozenset()


class TestPharmaProfile:
    def test_all_columns_profiled(self, pharma, pharma_profile):
        assert set(pharma_profile.col_meta["col_id"]) == set(pharma.columns["col_id"])

    def test_all_docs_profiled(self, pharma, pharma_profile):
        assert set(pharma_profile.doc_meta["doc_id"]) == set(pharma.docs["doc_id"])

    def test_value_sigs_for_string_columns(self, pharma, pharma_profile):
        str_cols = set(pharma.columns.loc[pharma.columns["dtype"] == "str",
                                          "col_id"])
        assert set(pharma_profile.value_sigs) == str_cols

    def test_distinct_counts_match_oracle(self, spark, pharma, pharma_profile):
        meta = pharma_profile.col_meta
        got = spark.createDataFrame(
            meta.loc[meta["dtype"] == "str", ["col_id", "n_distinct"]]
            .assign(n_distinct=lambda d: d["n_distinct"].astype("int64")))
        assert_equivalent(
            got,
            """SELECT col_id, count(DISTINCT value) AS n_distinct
               FROM vals GROUP BY col_id""",
            vals=pharma.string_values,
        )

    def test_content_vectors_dimension(self, pharma_profile):
        for de, v in list(pharma_profile.content_vecs.items())[:20]:
            assert v.shape == (DIM,)

    def test_docs_have_content_vectors(self, pharma, pharma_profile):
        missing = [d for d in pharma.docs["doc_id"]
                   if d not in pharma_profile.content_vecs]
        assert missing == []

    def test_meta_vectors_for_all_des(self, pharma_profile):
        for de in pharma_profile.doc_ids[:10] + pharma_profile.col_ids[:10]:
            assert de in pharma_profile.meta_vecs

    def test_encode_is_200d(self, pharma_profile):
        de = pharma_profile.doc_ids[0]
        assert pharma_profile.encode(de).shape == (2 * DIM,)

    def test_encode_concatenation(self, pharma_profile):
        de = pharma_profile.col_ids[0]
        enc = pharma_profile.encode(de)
        assert np.allclose(enc[:DIM], pharma_profile.meta_vecs[de])
        assert np.allclose(enc[DIM:], pharma_profile.content_vecs[de])

    def test_key_candidates_include_true_pks(self, pharma_profile):
        meta = pharma_profile.col_meta.set_index("col_id")
        assert "key-candidate" in meta.loc["drugs.drug_id", "tags"]
        assert "key-candidate" in meta.loc["diseases.disease_id", "tags"]

    def test_dup_fk_not_key_candidate(self, pharma_profile):
        meta = pharma_profile.col_meta.set_index("col_id")
        assert "key-candidate" not in meta.loc["drug_interactions.drug_id_a",
                                               "tags"]

    def test_numeric_stats_indexed(self, pharma, pharma_profile):
        num_cols = set(pharma.columns.loc[pharma.columns["dtype"] == "num",
                                          "col_id"])
        assert set(pharma_profile.numeric_stats.index) == num_cols

    def test_doc_tokens_filtered(self, pharma_profile):
        toks = pharma_profile.doc_tokens
        assert "the" not in set(toks["token"])

    def test_de_vector_prefers_joint(self, pharma_profile):
        de = pharma_profile.col_ids[0]
        assert np.allclose(pharma_profile.de_vector(de),
                           pharma_profile.content_vecs[de])
        pharma_profile.joint_vecs = {de: np.ones(3)}
        assert np.allclose(pharma_profile.de_vector(de), np.ones(3))
        pharma_profile.joint_vecs = {}

    def test_text_col_ids_tagged(self, pharma_profile):
        meta = pharma_profile.col_meta.set_index("col_id")
        for c in pharma_profile.text_col_ids():
            assert "text-search" in meta.loc[c, "tags"]
