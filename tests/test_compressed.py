"""Unit tests for CLA-lite compressed matrices (repro.lina.compressed)."""
import numpy as np
import pytest

from repro.lina.compressed import CLAMatrix


def _lowcard(n, m, card, seed=0):
    """Matrix whose columns have only ``card`` distinct values — the
    regime where CLA compresses well (paper Fig. 9 datasets)."""
    g = np.random.default_rng(seed)
    dicts = g.random((m, card)) * 10
    codes = g.integers(0, card, (n, m))
    return np.take_along_axis(dicts[np.newaxis, :, :].repeat(n, 0), codes[:, :, None], 2)[
        :, :, 0
    ]


@pytest.mark.parametrize("card", [1, 4, 32])
def test_roundtrip(card):
    a = _lowcard(200, 7, card)
    np.testing.assert_allclose(CLAMatrix.compress(a).decompress(), a)


def test_compression_ratio_improves_with_low_cardinality():
    low = CLAMatrix.compress(_lowcard(5000, 5, 4)).compression_ratio()
    high = CLAMatrix.compress(_lowcard(5000, 5, 4096, seed=1)).compression_ratio()
    assert low > high
    assert low > 1.5  # 4 distinct values over 5000 rows must compress


@pytest.mark.parametrize("f,npf", [(lambda v: v**2, lambda a: a**2),
                                   (lambda v: np.abs(v), np.abs),
                                   (lambda v: v * 3.0, lambda a: a * 3.0)])
def test_agg_cellwise_distinct(f, npf):
    a = _lowcard(300, 6, 8, seed=2)
    c = CLAMatrix.compress(a)
    assert abs(c.agg_cellwise_distinct(f) - npf(a).sum()) < 1e-8 * abs(npf(a).sum())


def test_col_agg_cellwise_distinct():
    a = _lowcard(300, 6, 8, seed=3)
    c = CLAMatrix.compress(a)
    np.testing.assert_allclose(
        c.col_agg_cellwise_distinct(lambda v: v**2), (a**2).sum(axis=0), rtol=1e-12
    )


def test_scale_dictionary_shallow_rewrite():
    a = _lowcard(100, 4, 5, seed=4)
    orig = CLAMatrix.compress(a)
    c = orig.scale_dictionary(lambda v: v**2)
    np.testing.assert_allclose(c.decompress(), a**2)
    # codes must be shared (shallow), only dictionaries rewritten
    for co, cn in zip(orig.columns, c.columns):
        assert co.codes is cn.codes


def test_n_distinct_and_counts():
    a = np.array([[1.0, 2.0], [1.0, 3.0], [1.0, 2.0]])
    c = CLAMatrix.compress(a)
    assert c.n_distinct == 1 + 2
    np.testing.assert_array_equal(c.columns[0].counts, [3])
    assert sorted(c.columns[1].counts.tolist()) == [1, 2]
