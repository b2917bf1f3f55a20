"""Spark query-engine tests: range (DuckDB-oracle-checked), kNN,
similarity, and TRACLUS clustering."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.queries.clustering import (
    characteristic_points,
    dbscan,
    extract_segments,
    segment_distance_matrix,
    traclus_labels,
)
from repro.queries.knn import knn_query, knn_query_numpy
from repro.queries.range_query import range_query, range_query_numpy, range_query_results
from repro.queries.similarity import similarity_query, similarity_query_numpy
from repro.workloads.distributions import workload_to_pandas


@pytest.fixture(scope="module")
def traj_df(spark, tiny_db):
    df = spark.createDataFrame(tiny_db).cache()
    df.count()
    yield df
    df.unpersist()


class TestRangeQuerySpark:
    def test_oracle_equivalence(self, spark, traj_df, tiny_db, tiny_boxes):
        """The Spark range query must match DuckDB executing the same
        spatio-temporal predicate join."""
        got = range_query(traj_df, tiny_boxes)
        sql = """
            SELECT DISTINCT w.qid AS qid, t.traj_id AS traj_id
            FROM traj t JOIN workload w
              ON t.x BETWEEN w.x_min AND w.x_max
             AND t.y BETWEEN w.y_min AND w.y_max
             AND t.t BETWEEN w.t_min AND w.t_max
        """
        assert_equivalent(got, sql, traj=tiny_db, workload=workload_to_pandas(tiny_boxes))

    def test_spark_matches_numpy(self, traj_df, tiny_db, tiny_boxes):
        assert range_query_results(traj_df, tiny_boxes) == range_query_numpy(
            tiny_db, tiny_boxes
        )

    def test_every_query_has_entry(self, traj_df, tiny_boxes):
        res = range_query_results(traj_df, tiny_boxes)
        assert set(res) == set(range(len(tiny_boxes)))

    def test_all_space_box_returns_all_trajectories(self, traj_df, tiny_db):
        lo = -1e12
        hi = 1e12
        box = np.array([[lo, hi, lo, hi, lo, hi]])
        res = range_query_results(traj_df, box)
        assert res[0] == frozenset(tiny_db["traj_id"].unique().tolist())

    def test_empty_box_returns_nothing(self, traj_df):
        box = np.array([[-2e9, -1e9, -2e9, -1e9, -2e9, -1e9]])
        assert range_query_results(traj_df, box)[0] == frozenset()


def _window_of(db, tid, frac=0.1):
    q = db[db["traj_id"] == tid]
    t0, t1 = q["t"].min(), q["t"].max()
    span = t1 - t0
    return (t0 + frac * span, t1 - frac * span)


class TestKNNSpark:
    @pytest.mark.parametrize("measure", ["edr", "t2vec"])
    def test_spark_matches_numpy(self, traj_df, tiny_db, measure):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        spark_res = knn_query(traj_df, q, k=3, window=win, measure=measure, exclude=tid)
        numpy_res = knn_query_numpy(tiny_db, q, k=3, window=win, measure=measure, exclude=tid)
        assert spark_res == numpy_res

    def test_self_is_nearest_when_not_excluded(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        res = knn_query(traj_df, q, k=1, window=win, measure="edr")
        assert res == [tid]

    def test_k_limits_result_size(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        avail = tiny_db[(tiny_db["t"] >= win[0]) & (tiny_db["t"] <= win[1])][
            "traj_id"
        ].nunique()
        got = knn_query(traj_df, q, k=2, window=win, measure="t2vec")
        assert len(got) == min(2, avail)

    def test_unknown_measure_raises(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        with pytest.raises(ValueError):
            knn_query(traj_df, q, k=1, window=(0.0, 1.0), measure="dtw")


class TestSimilaritySpark:
    def test_spark_matches_numpy(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        spark_res = similarity_query(traj_df, q, window=win, delta=5000.0, exclude=tid)
        numpy_res = similarity_query_numpy(tiny_db, q, window=win, delta=5000.0, exclude=tid)
        assert spark_res == numpy_res

    def test_query_matches_itself(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        assert tid in similarity_query(traj_df, q, window=win, delta=1.0)

    def test_huge_delta_matches_all_covering(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        win = _window_of(tiny_db, tid)
        res = similarity_query(traj_df, q, window=win, delta=1e12)
        # every trajectory whose span covers the window must match
        qt = q[(q["t"] >= win[0]) & (q["t"] <= win[1])]["t"]
        expected = sorted(
            int(t)
            for t, g in tiny_db.groupby("traj_id")
            if g["t"].min() <= qt.min() and g["t"].max() >= qt.max()
        )
        assert res == expected

    def test_empty_window_returns_empty(self, traj_df, tiny_db):
        tid = int(tiny_db["traj_id"].iloc[0])
        q = tiny_db[tiny_db["traj_id"] == tid]
        assert similarity_query(traj_df, q, window=(-2.0, -1.0), delta=10.0) == []


class TestClustering:
    def test_characteristic_points_include_endpoints(self):
        g = np.random.default_rng(0)
        x = np.cumsum(g.normal(size=80))
        y = np.cumsum(g.normal(size=80))
        cp = characteristic_points(x, y)
        assert cp[0] == 0 and cp[-1] == 79

    def test_straight_line_few_characteristic_points(self):
        x = np.linspace(0, 100, 60)
        y = np.zeros(60)
        cp = characteristic_points(x, y)
        assert len(cp) <= 5

    def test_zigzag_many_characteristic_points(self):
        x = np.arange(40.0)
        y = np.tile([0.0, 30.0], 20)
        assert len(characteristic_points(x, y)) > len(
            characteristic_points(x, np.zeros(40))
        )

    def test_short_trajectory_passthrough(self):
        assert list(characteristic_points(np.array([0.0, 1.0]), np.array([0.0, 1.0]))) == [0, 1]

    def test_extract_segments_schema(self, traj_df):
        segs = extract_segments(traj_df)
        assert list(segs.columns) == ["traj_id", "sx", "sy", "ex", "ey"]
        assert len(segs) > 0

    def test_segment_distance_matrix_properties(self):
        segs = pd.DataFrame(
            {
                "sx": [0.0, 0.0, 100.0], "sy": [0.0, 5.0, 100.0],
                "ex": [10.0, 10.0, 120.0], "ey": [0.0, 5.0, 100.0],
            }
        )
        d = segment_distance_matrix(segs)
        assert np.allclose(np.diag(d), 0.0)
        assert d[0, 1] < d[0, 2]  # parallel nearby beats far away

    def test_dbscan_two_blobs(self):
        a = np.zeros((5, 1))
        b = np.full((5, 1), 100.0)
        pts = np.vstack([a, b]).ravel()
        dmat = np.abs(pts[:, None] - pts[None, :])
        labels = dbscan(dmat, eps=5.0, min_pts=3)
        assert len(set(labels[:5])) == 1 and labels[0] != -1
        assert len(set(labels[5:])) == 1 and labels[5] != labels[0]
        assert labels[0] != -1 and labels[5] != -1

    def test_dbscan_noise(self):
        dmat = np.abs(np.arange(5.0)[:, None] * 100 - np.arange(5.0)[None, :] * 100)
        labels = dbscan(dmat, eps=1.0, min_pts=2)
        assert np.all(labels == -1)

    def test_traclus_labels_cover_all_trajectories(self, traj_df, tiny_db):
        labels = traclus_labels(traj_df, eps=2000.0, min_pts=2)
        assert set(labels) == set(int(t) for t in tiny_db["traj_id"].unique())

    def test_traclus_identical_databases_f1_one(self, traj_df):
        from repro.queries.measures import clustering_f1

        a = traclus_labels(traj_df, eps=2000.0, min_pts=2)
        b = traclus_labels(traj_df, eps=2000.0, min_pts=2)
        assert clustering_f1(a, b) == 1.0

    def test_max_segments_cap(self, traj_df):
        labels = traclus_labels(traj_df, eps=2000.0, min_pts=2, max_segments=10)
        assert isinstance(labels, dict)
