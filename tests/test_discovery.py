"""Tests for the discovery layer (K-means, concepts, relations)."""
import numpy as np
import pytest

from repro.discovery import (
    cluster_purity,
    discover_concepts,
    kmeans,
    relation_hit_rate,
    top_relations,
)


def _blobs(n_per=30, k=3, d=4, sep=10.0, seed=0):
    g = np.random.default_rng(seed)
    centers = g.standard_normal((k, d)) * sep
    x = np.concatenate(
        [centers[c] + g.standard_normal((n_per, d)) for c in range(k)]
    )
    truth = np.repeat(np.arange(k), n_per)
    return x, truth


def test_kmeans_recovers_separated_blobs():
    x, truth = _blobs()
    labels, centers, inertia = kmeans(x, 3, seed=0)
    assert cluster_purity(labels, truth) == 1.0
    assert centers.shape == (3, 4)
    assert inertia > 0


def test_kmeans_k1():
    x, _ = _blobs()
    labels, centers, _ = kmeans(x, 1, seed=0)
    assert set(labels) == {0}
    np.testing.assert_allclose(centers[0], x.mean(axis=0), atol=1e-8)


@pytest.mark.parametrize("k", [0, 1000])
def test_kmeans_rejects_bad_k(k):
    x, _ = _blobs(n_per=5)
    with pytest.raises(ValueError):
        kmeans(x, k)


def test_kmeans_deterministic_with_seed():
    x, _ = _blobs(seed=1)
    l1, _, i1 = kmeans(x, 3, seed=7)
    l2, _, i2 = kmeans(x, 3, seed=7)
    np.testing.assert_array_equal(l1, l2)
    assert i1 == i2


def test_kmeans_labels_cover_all_points():
    x, _ = _blobs()
    labels, _, _ = kmeans(x, 3, seed=0)
    assert len(labels) == len(x)
    assert labels.min() >= 0 and labels.max() < 3


def test_cluster_purity_perfect_and_random():
    truth = np.array([0, 0, 1, 1])
    assert cluster_purity(np.array([1, 1, 0, 0]), truth) == 1.0
    assert cluster_purity(np.array([0, 1, 0, 1]), truth) == 0.5


def test_discover_concepts_on_planted_rows():
    """Rows built from k distinct directions must cluster purely."""
    g = np.random.default_rng(2)
    k, d = 3, 6
    dirs = np.eye(d)[:k]
    truth = g.integers(0, k, 90)
    rows = dirs[truth] * (1 + g.random((90, 1))) + 0.01 * g.standard_normal(
        (90, d)
    )
    report = discover_concepts(rows, k, truth=truth, seed=0)
    assert report.purity > 0.95
    assert len(report.exemplars) == k


def test_discover_concepts_normalizes_magnitude():
    """A huge-magnitude row in the same direction must share a cluster."""
    dirs = np.eye(4)[:2]
    truth = np.array([0, 0, 1, 1, 0])
    rows = dirs[truth].astype(float)
    rows[4] *= 1000.0
    report = discover_concepts(rows, 2, truth=truth, seed=0)
    assert report.purity == 1.0


def test_top_relations_orders_by_magnitude():
    core = np.zeros((2, 2, 2))
    core[1, 0, 1] = -9.0
    core[0, 1, 0] = 5.0
    factors = [np.random.default_rng(3).random((4, 2)) for _ in range(3)]
    rels = top_relations(core, factors, n_relations=2, n_attributes=2)
    assert rels[0].core_index == (1, 0, 1)
    assert rels[0].strength == -9.0
    assert rels[1].core_index == (0, 1, 0)


def test_top_relations_decodes_top_attributes():
    core = np.zeros((2, 2))
    core[1, 0] = 3.0
    f0 = np.array([[0.0, 0.1], [0.0, 0.9], [0.0, 0.5]])
    f1 = np.array([[0.8, 0.0], [0.2, 0.0]])
    rels = top_relations(core, [f0, f1], n_relations=1, n_attributes=1)
    assert rels[0].top_attributes[0] == [1]  # largest |f0[:, 1]|
    assert rels[0].top_attributes[1] == [0]  # largest |f1[:, 0]|


def test_top_relations_mode_restriction():
    core = np.ones((2, 2, 2))
    factors = [np.random.default_rng(4).random((3, 2)) for _ in range(3)]
    rels = top_relations(core, factors, n_relations=1, modes=[1, 2])
    assert len(rels[0].top_attributes) == 2


def test_relation_hit_rate():
    from repro.discovery.relations import Relation

    rels = [
        Relation((0, 0), 1.0, [[0, 1], [5, 6]]),
        Relation((1, 1), 0.5, [[2], [7]]),
    ]
    planted = [np.array([5]), np.array([9])]
    genre_of = np.array([0, 0, 1])
    # rel 0: movies {0,1} -> genre 0, decoded {5,6} hits planted {5}
    # rel 1: movie {2} -> genre 1, decoded {7} misses planted {9}
    rate = relation_hit_rate(
        rels, 1, planted, genre_of_top_movie=genre_of, movie_mode_pos=0
    )
    assert rate == 0.5


def test_relation_hit_rate_empty():
    assert relation_hit_rate([], 0, [np.array([1])]) == 0.0
