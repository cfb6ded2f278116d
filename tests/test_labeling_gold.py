"""Labeling functions, vote matrix, and gold-tuning tests (paper §4.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.weak.gold import lf_accuracies, make_gold_pairs, select_lfs
from repro.weak.labeling import LF_NAMES, label_matrix, lf_topk


class TestContext:
    def test_indexes_built(self, ctx_1b):
        assert len(ctx_1b.ann) == len(ctx_1b.col_ids)
        assert ctx_1b.bm25_content.n_des > 0
        assert ctx_1b.bm25_meta.n_des > 0

    def test_doc_tokens_scoped(self, ctx_1b, bench_1b):
        assert set(ctx_1b.doc_tokens) <= set(bench_1b.queries)


class TestLfTopk:
    @pytest.mark.parametrize("lf", LF_NAMES)
    def test_returns_scoped_columns(self, ctx_1b, lf):
        doc = ctx_1b.doc_ids[0]
        top = lf_topk(ctx_1b, doc, lf, k=5)
        assert len(top) <= 5
        assert top <= set(ctx_1b.col_ids)

    def test_unknown_lf(self, ctx_1b):
        with pytest.raises(ValueError):
            lf_topk(ctx_1b, ctx_1b.doc_ids[0], "bogus")

    def test_unknown_doc_empty(self, ctx_1b):
        assert lf_topk(ctx_1b, "no-such-doc", "semantic") == set()

    def test_content_lf_finds_cited_column(self, ctx_1b, bench_1b):
        """The BM25 content LF must recover value-cited GT columns for a
        clear majority of documents (it is the strongest signal)."""
        gt = bench_1b.gt_cols
        value_links = gt[gt["kind"] == "value"]
        hits = total = 0
        for doc, grp in list(value_links.groupby("doc_id"))[:50]:
            top = lf_topk(ctx_1b, doc, "content", k=10)
            scoped = set(grp["col_id"]) & set(ctx_1b.col_ids)
            if not scoped:
                continue
            total += 1
            hits += bool(top & scoped)
        assert total and hits / total > 0.7


class TestLabelMatrix:
    def test_shape_and_alignment(self, ctx_1b):
        docs = ctx_1b.doc_ids[:4]
        cols = ctx_1b.col_ids[:6]
        pairs, votes = label_matrix(ctx_1b, docs, cols, k=5)
        assert votes.shape == (24, len(LF_NAMES))
        assert list(pairs.columns) == ["doc_id", "col_id"]
        assert len(pairs) == 24

    def test_votes_binary(self, ctx_1b):
        docs = ctx_1b.doc_ids[:3]
        _, votes = label_matrix(ctx_1b, docs, ctx_1b.col_ids[:5], k=5)
        assert set(np.unique(votes)) <= {0, 1}

    def test_lf_subset(self, ctx_1b):
        docs = ctx_1b.doc_ids[:2]
        _, votes = label_matrix(ctx_1b, docs, ctx_1b.col_ids[:4], k=5,
                                lfs=("content",))
        assert votes.shape[1] == 1


class TestGold:
    def test_make_gold_pairs_balance(self, bench_1b, ctx_1b):
        gold = make_gold_pairs(bench_1b.gt_cols, bench_1b.queries,
                               ctx_1b.col_ids, frac=0.1, seed=0)
        assert set(gold["y"]) == {0, 1}
        n_pos = int((gold["y"] == 1).sum())
        assert abs(n_pos - (gold["y"] == 0).sum()) <= 1

    def test_gold_positives_are_true_links(self, bench_1b, ctx_1b):
        gold = make_gold_pairs(bench_1b.gt_cols, bench_1b.queries,
                               ctx_1b.col_ids, frac=0.1, seed=0)
        truth = set(map(tuple,
                        bench_1b.gt_cols[["doc_id", "col_id"]].itertuples(index=False)))
        for r in gold[gold["y"] == 1].itertuples():
            assert (r.doc_id, r.col_id) in truth

    def test_lf_accuracies_scores_all(self, ctx_1b, bench_1b):
        gold = make_gold_pairs(bench_1b.gt_cols, bench_1b.queries,
                               ctx_1b.col_ids, frac=0.1, seed=0)
        accs = lf_accuracies(ctx_1b, gold)
        assert set(accs.index) == set(LF_NAMES)
        assert ((accs >= 0) & (accs <= 1)).all()

    def test_semantic_lf_eliminated_on_1b(self, ctx_1b, bench_1b):
        """On our lakes the solo-embedding LF is the imprecise one (it
        returns topic-mates, not the cited columns) — the gold heuristic
        must switch it off (§4.1)."""
        gold = make_gold_pairs(bench_1b.gt_cols, bench_1b.queries,
                               ctx_1b.col_ids, frac=0.1, seed=0)
        kept = select_lfs(lf_accuracies(ctx_1b, gold))
        assert "semantic" not in kept
        assert "content" in kept

    def test_select_lfs_ratio(self):
        accs = pd.Series({"a": 0.8, "b": 0.5, "c": 0.3})
        assert select_lfs(accs, ratio=0.5) == ("a", "b")
        assert select_lfs(accs, ratio=0.9) == ("a",)

    def test_select_lfs_never_empty(self):
        accs = pd.Series({"a": 0.0, "b": 0.0})
        assert len(select_lfs(accs)) >= 1
