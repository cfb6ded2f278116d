"""Benchmark-suite construction tests (paper Table 2)."""
import numpy as np
import pytest

from repro.lake.benchmarks import (Doc2TableBench, JoinBench, PkfkBench,
                                   UnionBench, benchmark_stats,
                                   is_variant_table)

ALL_BENCH_NAMES = {"1A", "1B", "1C", "2A", "2B", "2C-SS", "2C-MS", "2C-LS",
                   "2D-drugbank", "2D-chembl", "2D-chebi", "3A", "3B"}


class TestConstruction:
    def test_all_benchmarks_present(self, benches):
        assert set(benches) == ALL_BENCH_NAMES

    def test_variant_detection(self):
        assert is_variant_table("drugs_v1")
        assert not is_variant_table("drugs")
        assert not is_variant_table("v1_drugs")

    @pytest.mark.parametrize("name", ["1A", "1B", "1C"])
    def test_doc_benches(self, benches, name):
        b = benches[name]
        assert isinstance(b, Doc2TableBench)
        assert len(b.queries) > 50
        assert set(b.gt_tables["table"]) <= set(b.candidate_tables)

    def test_doc_bench_excludes_variants(self, benches):
        assert not any(is_variant_table(t)
                       for t in benches["1A"].candidate_tables)

    @pytest.mark.parametrize("name", ["2A", "2B", "2C-SS", "2C-MS", "2C-LS"])
    def test_join_benches(self, benches, name):
        b = benches[name]
        assert isinstance(b, JoinBench)
        assert len(b.gt_pairs) > 0
        assert (b.gt_pairs["col_a"] < b.gt_pairs["col_b"]).all()

    def test_join_answers_symmetric(self, benches):
        b = benches["2B"]
        q = b.queries[0]
        for other in b.answers(q):
            assert q in b.answers(other)

    def test_2a_includes_zero_overlap_pairs(self, benches, ukopen):
        """The manual-annotation GT annotates same-domain pairs even with
        no syntactic overlap (the paper's stated property of 2A)."""
        b = benches["2A"]
        dv = ukopen.distinct_values()
        by_col = {c: set(g["value"]) for c, g in dv.groupby("col_id")}
        overlaps = [len(by_col[a] & by_col[bb])
                    for a, bb in b.gt_pairs.itertuples(index=False)]
        assert min(overlaps) == 0

    def test_2a_excludes_homographs(self, benches, ukopen):
        cols = ukopen.columns.set_index("col_id")
        for a, bb in benches["2A"].gt_pairs.itertuples(index=False):
            assert not cols.loc[a, "topic"].startswith("hg_")

    def test_2b_gt_has_high_containment(self, benches, pharma):
        b = benches["2B"]
        cont = pharma.exact_containment(list(
            set(b.gt_pairs["col_a"]) | set(b.gt_pairs["col_b"])))
        merged = b.gt_pairs.merge(cont, on=["col_a", "col_b"])
        best = merged[["cont_a", "cont_b"]].max(axis=1)
        assert (best >= 0.7).all()

    @pytest.mark.parametrize("name,db", [("2D-drugbank", "drugbank"),
                                         ("2D-chembl", "chembl"),
                                         ("2D-chebi", "chebi")])
    def test_pkfk_benches(self, benches, name, db):
        b = benches[name]
        assert isinstance(b, PkfkBench)
        assert b.database == db
        assert len(b.gt_links) > 0

    @pytest.mark.parametrize("name", ["3A", "3B"])
    def test_union_benches(self, benches, name):
        b = benches[name]
        assert isinstance(b, UnionBench)
        for q in b.queries:
            assert len(b.answers(q)) == 3  # 1 base + 3 variants per group

    def test_union_answers_exclude_self(self, benches):
        b = benches["3B"]
        for q in b.queries:
            assert q not in b.answers(q)


class TestStats:
    @pytest.fixture(scope="class")
    def stats(self, lakes, benches):
        return benchmark_stats(lakes, benches).set_index("benchmark")

    def test_all_rows(self, stats):
        assert set(stats.index) == ALL_BENCH_NAMES

    def test_queries_positive(self, stats):
        assert (stats["n_queries"] > 0).all()

    def test_mqcr_in_unit_interval(self, stats):
        assert ((stats["mQCR"] > 0) & (stats["mQCR"] <= 1)).all()

    def test_skew_ordering_matches_paper(self, stats):
        """The paper's skew regimes: SS least skewed, LS most skewed;
        2B more skewed than 2A; doc benchmarks strongly skewed."""
        assert stats.loc["2C-LS", "mQCR"] < stats.loc["2C-MS", "mQCR"] \
            < stats.loc["2C-SS", "mQCR"]
        assert stats.loc["2B", "mQCR"] < stats.loc["2A", "mQCR"]
        assert stats.loc["1A", "mQCR"] < 0.2

    def test_pkfk_single_query(self, stats):
        for name in ("2D-drugbank", "2D-chembl", "2D-chebi"):
            assert stats.loc[name, "n_queries"] == 1

    def test_answer_sizes_positive(self, stats):
        assert (stats["avg_answer_size"] > 0).all()

    def test_doc_answer_sizes_modest(self, stats):
        for name in ("1A", "1B", "1C"):
            assert 1 <= stats.loc[name, "avg_answer_size"] <= 10
