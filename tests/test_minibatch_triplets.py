"""Mini-batch generator and triplet-generation tests (paper §4.2, Fig. 5)."""
import numpy as np
import pytest

from repro.joint.minibatch import make_minibatches
from repro.joint.triplets import generate_triplets


class TestMinibatches:
    def test_covers_all_des(self):
        rng = np.random.default_rng(0)
        docs = [f"d{i}" for i in range(50)]
        cols = [f"c{i}" for i in range(100)]
        batches = make_minibatches(docs, cols, batch_frac=0.1, rng=rng)
        seen_d = {d for dc, _ in batches for d in dc}
        seen_c = {c for _, cc in batches for c in cc}
        assert seen_d == set(docs) and seen_c == set(cols)

    def test_doc_chunks_disjoint(self):
        rng = np.random.default_rng(1)
        docs = [f"d{i}" for i in range(40)]
        cols = [f"c{i}" for i in range(40)]
        batches = make_minibatches(docs, cols, batch_frac=0.25, rng=rng)
        all_docs = [d for dc, _ in batches for d in dc]
        assert len(all_docs) == len(set(all_docs))

    def test_batch_size_fraction(self):
        rng = np.random.default_rng(2)
        batches = make_minibatches([f"d{i}" for i in range(100)],
                                   [f"c{i}" for i in range(200)],
                                   batch_frac=0.08, rng=rng)
        assert len(batches[0][0]) == 8
        assert len(batches[0][1]) == 16

    def test_min_size_floor(self):
        rng = np.random.default_rng(3)
        batches = make_minibatches(["d1", "d2", "d3", "d4", "d5"],
                                   ["c1", "c2", "c3", "c4", "c5"],
                                   batch_frac=0.08, min_size=4, rng=rng)
        assert len(batches[0][0]) >= 4

    def test_reshuffled_between_epochs(self):
        rng = np.random.default_rng(4)
        docs = [f"d{i}" for i in range(64)]
        cols = [f"c{i}" for i in range(64)]
        b1 = make_minibatches(docs, cols, batch_frac=0.1, rng=rng)
        b2 = make_minibatches(docs, cols, batch_frac=0.1, rng=rng)
        assert b1[0][0] != b2[0][0]


class TestTriplets:
    @pytest.fixture
    def setup(self):
        docs = ["d1", "d2"]
        cols = ["c1", "c2", "c3", "c4"]
        rel = {("d1", "c1"): 0.9, ("d1", "c2"): 0.8, ("d1", "c3"): 0.1,
               ("d1", "c4"): 0.2, ("d2", "c1"): 0.1, ("d2", "c2"): 0.1,
               ("d2", "c3"): 0.1, ("d2", "c4"): 0.1}
        des = docs + cols
        index = {de: i for i, de in enumerate(des)}
        rng = np.random.default_rng(0)
        Z = rng.standard_normal((len(des), 4))
        return docs, cols, rel, Z, index

    def test_positives_aggregated(self, setup):
        docs, cols, rel, Z, index = setup
        trips = generate_triplets(docs, cols, rel, Z, index)
        # d1 has 2 positives -> single triplet with both aggregated
        assert len(trips) == 1
        t = trips[0]
        assert t.anchor == index["d1"]
        assert set(t.positives) == {index["c1"], index["c2"]}

    def test_doc_without_positives_skipped(self, setup):
        docs, cols, rel, Z, index = setup
        trips = generate_triplets(docs, cols, rel, Z, index)
        assert all(t.anchor != index["d2"] for t in trips)

    def test_hard_sampling_selects_close_negatives(self, setup):
        docs, cols, rel, Z, index = setup
        # place c3 close to d1 and c4 far: avg cutoff keeps only c3
        Z[index["c3"]] = Z[index["d1"]] + 0.01
        Z[index["c4"]] = Z[index["d1"]] + 10.0
        trips = generate_triplets(docs, cols, rel, Z, index, hard="avg")
        assert trips[0].negatives == [index["c3"]]

    def test_median_cutoff(self, setup):
        docs, cols, rel, Z, index = setup
        trips = generate_triplets(docs, cols, rel, Z, index, hard="median")
        assert len(trips[0].negatives) >= 1

    def test_no_hard_sampling_quadratic(self, setup):
        docs, cols, rel, Z, index = setup
        trips = generate_triplets(docs, cols, rel, Z, index, hard=None)
        # 2 positives x 2 negatives for d1
        assert len(trips) == 4
        assert all(len(t.positives) == 1 and len(t.negatives) == 1
                   for t in trips)

    def test_threshold_parameter(self, setup):
        docs, cols, rel, Z, index = setup
        trips = generate_triplets(docs, cols, rel, Z, index, pos_threshold=0.85)
        assert set(trips[0].positives) == {index["c1"]}

    def test_all_positive_doc_skipped(self):
        rel = {("d", "c1"): 0.9, ("d", "c2"): 0.9}
        index = {"d": 0, "c1": 1, "c2": 2}
        Z = np.eye(3)
        assert generate_triplets(["d"], ["c1", "c2"], rel, Z, index) == []
