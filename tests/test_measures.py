"""Tests for the F1 quality measures (paper Eq. 3)."""
import pytest

from repro.queries.measures import cluster_pairs, clustering_f1, f1, mean_f1


class TestF1:
    def test_perfect(self):
        assert f1({1, 2, 3}, {1, 2, 3}) == 1.0

    def test_disjoint(self):
        assert f1({1, 2}, {3, 4}) == 0.0

    def test_both_empty_is_perfect(self):
        assert f1(set(), set()) == 1.0

    def test_one_empty_is_zero(self):
        assert f1({1}, set()) == 0.0
        assert f1(set(), {1}) == 0.0

    def test_known_value(self):
        # P = 1/2, R = 1/3 → F1 = 2·(1/6)/(5/6) = 0.4
        assert f1({1, 2, 3}, {1, 9}) == pytest.approx(0.4)

    def test_symmetric_in_knn_case(self):
        # equal-size sets → precision == recall == F1
        a, b = {1, 2, 3}, {2, 3, 4}
        assert f1(a, b) == pytest.approx(2 / 3)

    def test_accepts_iterables(self):
        assert f1([1, 2], (2, 1)) == 1.0


class TestMeanF1:
    def test_all_queries_counted(self):
        o = {0: {1}, 1: {2}}
        s = {0: {1}, 1: set()}
        assert mean_f1(o, s) == pytest.approx(0.5)

    def test_union_of_query_ids(self):
        o = {0: {1}}
        s = {1: {2}}  # o side for qid 1 is empty, s side for 0 is empty
        assert mean_f1(o, s) == 0.0

    def test_empty_maps(self):
        assert mean_f1({}, {}) == 1.0


class TestClusterPairs:
    def test_pairs_within_cluster(self):
        labels = {1: 0, 2: 0, 3: 0, 4: 1}
        assert cluster_pairs(labels) == {
            frozenset({1, 2}), frozenset({1, 3}), frozenset({2, 3})
        }

    def test_noise_excluded(self):
        labels = {1: -1, 2: -1, 3: 0, 4: 0}
        assert cluster_pairs(labels) == {frozenset({3, 4})}

    def test_multi_label_membership(self):
        labels = {1: {0, 1}, 2: {0}, 3: {1}}
        assert cluster_pairs(labels) == {frozenset({1, 2}), frozenset({1, 3})}

    def test_clustering_f1_identical(self):
        labels = {1: 0, 2: 0, 3: 1, 4: 1}
        assert clustering_f1(labels, dict(labels)) == 1.0

    def test_clustering_f1_merged_clusters(self):
        o = {1: 0, 2: 0, 3: 1, 4: 1}
        s = {1: 0, 2: 0, 3: 0, 4: 0}
        # R_o = {12, 34}; R_s = all 6 pairs; P = 2/6, R = 1 → F1 = 0.5
        assert clustering_f1(o, s) == pytest.approx(0.5)
