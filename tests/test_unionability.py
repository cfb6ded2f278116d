"""Unionable-table discovery tests (paper §6.3 mechanics)."""
import pytest

from repro.discovery.unionability import MEASURES, UnionIndex


@pytest.fixture(scope="module")
def idx_3b(pharma_profile, benches):
    return UnionIndex(pharma_profile, benches["3B"].queries)


@pytest.fixture(scope="module")
def idx_3a(ukopen_profile, benches):
    return UnionIndex(ukopen_profile, benches["3A"].queries)


class TestColumnScores:
    def test_string_pair_measures(self, idx_3b):
        a = idx_3b.cols_of[idx_3b.tables[0]][0]
        b = idx_3b.cols_of[idx_3b.tables[1]][0]
        sc = idx_3b.column_scores(a, b)
        assert set(sc) >= set(MEASURES)
        assert sc["numeric"] is None  # str-str pair has no numeric score

    def test_self_pair_perfect(self, idx_3b):
        a = idx_3b.cols_of[idx_3b.tables[0]][0]
        sc = idx_3b.column_scores(a, a)
        assert sc["name"] == 1.0
        assert sc["containment"] == pytest.approx(1.0)
        assert sc["semantic"] == pytest.approx(1.0, abs=1e-6)


class TestMatching:
    def test_greedy_matching_disjoint(self):
        pairs = [(0.9, 0, 0), (0.8, 0, 1), (0.7, 1, 1)]
        score = UnionIndex._greedy_match(pairs, 2, 2)
        # picks (0.9, 0, 0) then (0.7, 1, 1): columns used once each
        assert score == pytest.approx((0.9 + 0.7) / 2)

    def test_greedy_ignores_nonpositive(self):
        assert UnionIndex._greedy_match([(0.0, 0, 0)], 1, 1) == 0.0

    def test_normalization_by_wider_table(self):
        pairs = [(1.0, 0, 0)]
        assert UnionIndex._greedy_match(pairs, 1, 3) == pytest.approx(1 / 3)


class TestRanking:
    def test_group_members_rank_first_ensemble(self, idx_3b, benches):
        bench = benches["3B"]
        hits = 0
        for q in bench.queries:
            truth = bench.answers(q)
            ranked = [t for t, _ in idx_3b.rank(q, k=len(truth))]
            hits += len(set(ranked) & truth) / len(truth)
        assert hits / len(bench.queries) > 0.7

    def test_single_measure_rank(self, idx_3b):
        out = idx_3b.rank(idx_3b.tables[0], k=3, measures=("semantic",))
        assert len(out) <= 3

    def test_numeric_only_often_unanswerable(self, idx_3b, benches):
        """3B variants drop numeric columns — the numeric measure alone
        answers few queries (paper Table 5: 20%)."""
        answered = sum(
            bool(idx_3b.rank(q, k=3, measures=("numeric",)))
            for q in benches["3B"].queries)
        assert answered < len(benches["3B"].queries) * 0.5

    @pytest.mark.parametrize("combiner", ["ensemble", "aurum", "d3l"])
    def test_all_combiners_run(self, idx_3b, combiner):
        out = idx_3b.rank(idx_3b.tables[0], k=3, combiner=combiner)
        assert isinstance(out, list)

    def test_unknown_combiner(self, idx_3b):
        with pytest.raises(ValueError):
            idx_3b.table_score(idx_3b.tables[0], idx_3b.tables[1],
                               combiner="bogus")

    def test_rank_excludes_self(self, idx_3b):
        t = idx_3b.tables[0]
        assert t not in [x for x, _ in idx_3b.rank(t)]

    def test_name_measure_beats_semantic_on_3a_mirrors(self, idx_3a, benches):
        """The ukopen mirror groups are semantically indistinguishable
        from their originals; the name measure separates them (the
        mechanism behind 3A's name>semantic RR ordering)."""
        bench = benches["3A"]
        name_hits = sem_hits = 0
        for q in bench.queries:
            truth = bench.answers(q)
            k = len(truth)
            name_hits += len({t for t, _ in idx_3a.rank(q, k=k, measures=("name",))} & truth)
            sem_hits += len({t for t, _ in idx_3a.rank(q, k=k, measures=("semantic",))} & truth)
        assert name_hits >= sem_hits

    def test_scores_sorted(self, idx_3b):
        out = idx_3b.rank(idx_3b.tables[0])
        scores = [s for _, s in out]
        assert scores == sorted(scores, reverse=True)
