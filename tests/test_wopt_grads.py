"""Numerical-gradient checks for the Tucker-wOPT baseline's dense loss."""
import numpy as np
import pytest

from repro.baselines.tucker_wopt import _dense_footprint_bytes, _loss_and_grads
from repro.synth_data import sparse_tensor_uniform
from repro.tensor.linalg import init_factors


@pytest.fixture(scope="module")
def setup():
    t = sparse_tensor_uniform(shape=(5, 4, 3), nnz=30, seed=0)
    x, w = t.to_dense(), t.mask_dense()
    factors, core = init_factors(t.shape, (2, 2, 2), seed=1)
    return x, w, core, factors


def _num_grad(f, arr, eps=1e-6):
    g = np.zeros_like(arr)
    it = np.nditer(arr, flags=["multi_index"])
    for _ in it:
        i = it.multi_index
        arr[i] += eps
        up = f()
        arr[i] -= 2 * eps
        dn = f()
        arr[i] += eps
        g[i] = (up - dn) / (2 * eps)
    return g


def test_core_gradient_matches_numerical(setup):
    x, w, core, factors = setup
    _, g_core, _ = _loss_and_grads(x, w, core, factors)
    num = _num_grad(lambda: _loss_and_grads(x, w, core, factors)[0], core)
    np.testing.assert_allclose(g_core, num, atol=1e-4)


@pytest.mark.parametrize("mode", [0, 1, 2])
def test_factor_gradient_matches_numerical(setup, mode):
    x, w, core, factors = setup
    _, _, g_factors = _loss_and_grads(x, w, core, factors)
    num = _num_grad(
        lambda: _loss_and_grads(x, w, core, factors)[0], factors[mode]
    )
    np.testing.assert_allclose(g_factors[mode], num, atol=1e-4)


def test_loss_only_counts_observed(setup):
    """Entries outside the mask must not contribute to the loss."""
    x, w, core, factors = setup
    loss1, _, _ = _loss_and_grads(x, w, core, factors)
    x2 = x.copy()
    x2[w == 0] = 99.0  # arbitrary garbage at unobserved cells
    loss2, _, _ = _loss_and_grads(x2, w, core, factors)
    assert loss1 == pytest.approx(loss2)


def test_dense_footprint_scales_with_order():
    b3 = _dense_footprint_bytes((100,) * 3, (3,) * 3)
    b4 = _dense_footprint_bytes((100,) * 4, (3,) * 4)
    assert b4 > 50 * b3  # explodes with order — the wOPT scaling story
