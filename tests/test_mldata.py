"""Dataset generators: shape/sparsity character of the paper's datasets."""
import numpy as np

from repro.data import mldata
from repro.lina.sparse import CSR


def test_dense_features_deterministic():
    a = mldata.dense_features(100, 5, seed=1)
    b = mldata.dense_features(100, 5, seed=1)
    np.testing.assert_array_equal(a, b)
    assert a.shape == (100, 5)


def test_sparse_features():
    X = mldata.sparse_features(500, 40, 0.1, seed=2)
    assert isinstance(X, CSR)
    assert abs(X.sparsity - 0.1) < 0.01


def test_binary_labels_balanced_and_pm1():
    X = mldata.dense_features(400, 8, seed=3)
    y = mldata.binary_labels(X)
    assert set(np.unique(y)) == {-1.0, 1.0}
    assert 0.4 < (y > 0).mean() < 0.6


def test_onehot_labels():
    Y = mldata.onehot_labels(200, 5, seed=4)
    assert Y.shape == (200, 5)
    np.testing.assert_array_equal(Y.sum(axis=1), np.ones(200))


def test_airline_like_character():
    X = mldata.airline_like(1000, seed=5)
    assert X.shape == (1000, 29)
    # categorical-ish columns have low cardinality (CLA-friendly)
    assert len(np.unique(X[:, 0])) <= 30


def test_mnist_like_character():
    X = mldata.mnist_like(500, seed=6)
    assert X.shape == (500, 784)
    assert 0.2 < X.sparsity < 0.3


def test_netflix_like_character():
    X = mldata.netflix_like(1000, 500, seed=7)
    assert 0.005 < X.sparsity < 0.02
    assert set(np.unique(X.values)) <= {1.0, 2.0, 3.0, 4.0, 5.0}


def test_amazon_like_ultra_sparse():
    X = mldata.amazon_like(5000, 5000, seed=8)
    assert X.sparsity < 5e-4  # ultra-sparse
    assert X.nnz > 0
