"""Joint-representation pipeline integration tests (paper §4 end-to-end)."""
import numpy as np
import pytest

from repro.discovery.doc2table import evaluate_rankings
from repro.joint.pipeline import (TrainingData, apply_joint,
                                  build_training_dataset, pair_features,
                                  train_joint_model)


class TestTrainingDataset:
    def test_pairs_cover_sample_product(self, training_1b):
        td = training_1b
        assert len(td.pairs) == len(td.sampled_docs) * len(td.sampled_cols)

    def test_rel_in_unit_interval(self, training_1b):
        rel = training_1b.pairs["rel"]
        assert ((rel >= 0) & (rel <= 1)).all()

    def test_generative_model_fitted(self, training_1b):
        assert training_1b.generative.sens is not None
        assert len(training_1b.generative.sens) == len(training_1b.lfs_used)

    def test_labels_correlate_with_ground_truth(self, training_1b, bench_1b):
        """The weak labels must beat chance against the real GT links."""
        gt = set(map(tuple,
                     bench_1b.gt_cols[["doc_id", "col_id"]].itertuples(index=False)))
        p = training_1b.pairs
        y = np.array([(d, c) in gt for d, c in zip(p["doc_id"], p["col_id"])])
        if y.sum() == 0:
            pytest.skip("sample contains no GT links")
        mean_pos = p.loc[y, "rel"].mean()
        mean_neg = p.loc[~y, "rel"].mean()
        assert mean_pos > mean_neg + 0.2

    def test_rel_lookup(self, training_1b):
        lookup = training_1b.rel_lookup()
        r = training_1b.pairs.iloc[0]
        assert lookup[(r["doc_id"], r["col_id"])] == r["rel"]

    def test_pair_features_shape(self, pharma_profile, ctx_1b):
        docs = ctx_1b.doc_ids[:3]
        cols = ctx_1b.col_ids[:4]
        f = pair_features(pharma_profile, ctx_1b, docs, cols)
        assert f.shape == (12, 4)
        assert np.isfinite(f).all()


class TestTraining:
    @pytest.fixture(scope="class")
    def result(self, pharma_profile, training_1b):
        return train_joint_model(pharma_profile, training_1b,
                                 max_epochs=120, seed=0)

    def test_converges(self, result):
        assert result.epochs <= 120
        assert result.losses[-1] <= result.losses[0]

    def test_hard_sampling_fewer_epochs_than_quadratic_triplets(
            self, pharma_profile, training_1b, result):
        """§6.4/Fig. 10(b): disabling hard sampling slows training; per
        epoch it multiplies the triplet count."""
        from repro.joint.minibatch import make_minibatches
        from repro.joint.triplets import generate_triplets
        rng = np.random.default_rng(0)
        rel = training_1b.rel_lookup()
        batches = make_minibatches(training_1b.sampled_docs,
                                   training_1b.sampled_cols, rng=rng)
        doc_chunk, col_chunk = batches[0]
        des = list(doc_chunk) + list(col_chunk)
        X = np.stack([pharma_profile.encode(de) for de in des])
        Z = result.model.forward(X)
        index = {de: i for i, de in enumerate(des)}
        hard = generate_triplets(doc_chunk, col_chunk, rel, Z, index, hard="avg")
        full = generate_triplets(doc_chunk, col_chunk, rel, Z, index, hard=None)
        if hard:
            assert len(full) > len(hard)

    def test_apply_joint_covers_all_des(self, pharma_profile, result):
        apply_joint(pharma_profile, result.model)
        try:
            assert set(pharma_profile.joint_vecs) == set(
                pharma_profile.doc_ids + pharma_profile.col_ids)
            z = next(iter(pharma_profile.joint_vecs.values()))
            assert z.shape == (100,)
            assert np.isclose(np.linalg.norm(z), 1.0)
        finally:
            pharma_profile.joint_vecs = {}

    def test_joint_beats_solo_on_1b(self, spark, pharma_profile, bench_1b,
                                    engine_1b, result):
        """The paper's headline: the joint representation outperforms the
        solo embeddings for cross-modal discovery (§6.1)."""
        apply_joint(pharma_profile, result.model)
        try:
            joint = engine_1b.rank_embedding(dict(pharma_profile.joint_vecs))
        finally:
            pharma_profile.joint_vecs = {}
        solo = engine_1b.rank_embedding(pharma_profile.content_vecs)
        ev_j = evaluate_rankings(joint, bench_1b.gt_tables, [2]).iloc[0]
        ev_s = evaluate_rankings(solo, bench_1b.gt_tables, [2]).iloc[0]
        assert ev_j["precision"] > ev_s["precision"]
        assert ev_j["recall"] > ev_s["recall"]

    def test_training_deterministic(self, pharma_profile, training_1b):
        a = train_joint_model(pharma_profile, training_1b, max_epochs=5, seed=1)
        b = train_joint_model(pharma_profile, training_1b, max_epochs=5, seed=1)
        assert np.allclose(a.model.W1, b.model.W1)
        assert a.losses == b.losses
