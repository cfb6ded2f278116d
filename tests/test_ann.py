"""Semantic nearest-neighbour index tests (exact-cosine Annoy substitute)."""
import numpy as np
import pytest

from repro.index.ann import AnnIndex


@pytest.fixture(scope="module")
def index():
    rng = np.random.default_rng(0)
    mat = rng.standard_normal((50, 16))
    return AnnIndex([f"v{i:02d}" for i in range(50)], mat), mat


class TestAnnIndex:
    def test_self_is_nearest(self, index):
        idx, mat = index
        for i in (0, 7, 49):
            assert idx.query(mat[i], k=1)[0][0] == f"v{i:02d}"

    def test_matches_brute_force(self, index):
        idx, mat = index
        q = mat[3] + 0.01
        got = [i for i, _ in idx.query(q, k=5)]
        norm = mat / np.linalg.norm(mat, axis=1, keepdims=True)
        sims = norm @ (q / np.linalg.norm(q))
        expected = [f"v{i:02d}" for i in np.argsort(-sims)[:5]]
        assert got == expected

    def test_scores_are_cosines(self, index):
        idx, mat = index
        top = idx.query(mat[0], k=1)
        assert top[0][1] == pytest.approx(1.0)

    def test_k_clamped_to_size(self, index):
        idx, _ = index
        assert len(idx.query(np.ones(16), k=500)) == 50

    def test_batch_matches_single(self, index):
        idx, mat = index
        singles = [idx.query(mat[i], k=3) for i in range(4)]
        batched = idx.query_batch(mat[:4], k=3)
        for s, b in zip(singles, batched):
            assert [x[0] for x in s] == [x[0] for x in b]

    def test_zero_vector_query(self, index):
        idx, _ = index
        out = idx.query(np.zeros(16), k=3)
        assert len(out) == 3  # degenerate query still returns something

    def test_mismatched_ids_rejected(self):
        with pytest.raises(ValueError):
            AnnIndex(["a"], np.zeros((2, 4)))

    def test_len(self, index):
        idx, _ = index
        assert len(idx) == 50
