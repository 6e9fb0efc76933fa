"""Tests for the alias-method sampler (paper §3.3)."""
import numpy as np
import pytest

from repro.core.alias import AliasSampler


def test_uniform_weights():
    s = AliasSampler(np.ones(10))
    rng = np.random.default_rng(0)
    draws = s.draw(rng, 50_000)
    freq = np.bincount(draws, minlength=10) / 50_000
    assert np.abs(freq - 0.1).max() < 0.01


def test_skewed_weights_match_probabilities():
    w = np.array([1.0, 2.0, 4.0, 8.0, 16.0, 0.0, 1.0])
    s = AliasSampler(w)
    rng = np.random.default_rng(1)
    draws = s.draw(rng, 200_000)
    freq = np.bincount(draws, minlength=len(w)) / 200_000
    np.testing.assert_allclose(freq, w / w.sum(), atol=0.006)


def test_zero_weight_never_drawn():
    w = np.array([0.0, 1.0, 0.0, 3.0])
    draws = AliasSampler(w).draw(np.random.default_rng(2), 20_000)
    assert set(np.unique(draws)) <= {1, 3}


def test_deterministic_given_rng_seed():
    w = np.array([3.0, 1.0, 2.0])
    a = AliasSampler(w).draw(np.random.default_rng(7), 100)
    b = AliasSampler(w).draw(np.random.default_rng(7), 100)
    assert np.array_equal(a, b)


def test_single_weight():
    draws = AliasSampler(np.array([5.0])).draw(np.random.default_rng(3), 10)
    assert (draws == 0).all()


@pytest.mark.parametrize("bad", [[], [0.0, 0.0], [-1.0, 2.0]])
def test_invalid_weights_rejected(bad):
    with pytest.raises(ValueError):
        AliasSampler(np.array(bad))
