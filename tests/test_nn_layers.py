"""Numeric gradient checks for every layer — backprop is hand-written,
so this is the safety net."""
import numpy as np
import pytest

from repro.nn.layers import (
    BatchNorm,
    Dropout,
    Linear,
    MaxPoolNodes,
    PReLU,
    TreeConv,
)

RNG = np.random.default_rng(0)


def num_grad(f, x, eps=1e-6):
    g = np.zeros_like(x)
    it = np.nditer(x, flags=["multi_index"])
    while not it.finished:
        i = it.multi_index
        old = x[i]
        x[i] = old + eps
        fp = f()
        x[i] = old - eps
        fm = f()
        x[i] = old
        g[i] = (fp - fm) / (2 * eps)
        it.iternext()
    return g


def _tree_batch(B=2, M=4, D=3):
    X = RNG.standard_normal((B, M, D))
    L = np.array([[1, 2, -1, -1], [1, -1, -1, -1]], dtype=np.int32)
    R = np.array([[3, -1, -1, -1], [2, -1, -1, -1]], dtype=np.int32)
    mask = np.array([[1, 1, 1, 1], [1, 1, 1, 0]], dtype=np.float64)
    return X, L, R, mask


def test_treeconv_input_grad():
    X, L, R, mask = _tree_batch()
    layer = TreeConv(3, 5, RNG)
    dout = RNG.standard_normal((2, 4, 5))

    def loss():
        out, _ = layer.forward(X, L, R, mask)
        return float((out * dout).sum())

    out, cache = layer.forward(X, L, R, mask)
    layer.zero_grads()
    dX = layer.backward(cache, dout)
    assert np.allclose(dX, num_grad(loss, X), atol=1e-5)


@pytest.mark.parametrize("pname", ["Ws", "Wl", "Wr", "b"])
def test_treeconv_param_grads(pname):
    X, L, R, mask = _tree_batch()
    layer = TreeConv(3, 5, RNG)
    dout = RNG.standard_normal((2, 4, 5))

    def loss():
        out, _ = layer.forward(X, L, R, mask)
        return float((out * dout).sum())

    out, cache = layer.forward(X, L, R, mask)
    layer.zero_grads()
    layer.backward(cache, dout)
    assert np.allclose(layer.g[pname], num_grad(loss, layer.p[pname]), atol=1e-5)


def test_treeconv_masked_nodes_zero():
    X, L, R, mask = _tree_batch()
    layer = TreeConv(3, 5, RNG)
    out, _ = layer.forward(X, L, R, mask)
    assert np.all(out[1, 3] == 0)


def test_batchnorm_grads():
    X = RNG.standard_normal((3, 4, 6))
    mask = np.ones((3, 4))
    mask[2, 3] = 0
    layer = BatchNorm(6)
    dout = RNG.standard_normal(X.shape)

    def loss():
        out, _ = layer.forward(X, mask, train=True)
        return float((out * dout).sum())

    # freeze running-stat updates' effect by copying state each call
    out, cache = layer.forward(X, mask, train=True)
    layer.zero_grads()
    dX = layer.backward(cache, dout)
    assert np.allclose(dX, num_grad(loss, X), atol=1e-4)
    assert np.allclose(layer.g["gamma"], num_grad(loss, layer.p["gamma"]), atol=1e-4)
    assert np.allclose(layer.g["beta"], num_grad(loss, layer.p["beta"]), atol=1e-4)


def test_batchnorm_eval_uses_running_stats():
    layer = BatchNorm(2)
    X = RNG.standard_normal((50, 2)) * 3 + 1
    for _ in range(30):
        layer.forward(X, None, train=True)
    out, _ = layer.forward(X, None, train=False)
    assert abs(out.mean()) < 0.3
    assert abs(out.std() - 1.0) < 0.3


def test_prelu_grads():
    X = RNG.standard_normal((4, 6))
    layer = PReLU(6)
    dout = RNG.standard_normal(X.shape)

    def loss():
        out, _ = layer.forward(X)
        return float((out * dout).sum())

    out, cache = layer.forward(X)
    layer.zero_grads()
    dX = layer.backward(cache, dout)
    assert np.allclose(dX, num_grad(loss, X), atol=1e-5)
    assert np.allclose(layer.g["a"], num_grad(loss, layer.p["a"]), atol=1e-5)


def test_linear_grads():
    X = RNG.standard_normal((5, 3))
    layer = Linear(3, 4, RNG)
    dout = RNG.standard_normal((5, 4))

    def loss():
        out, _ = layer.forward(X)
        return float((out * dout).sum())

    out, cache = layer.forward(X)
    layer.zero_grads()
    dX = layer.backward(cache, dout)
    assert np.allclose(dX, num_grad(loss, X), atol=1e-5)
    assert np.allclose(layer.g["W"], num_grad(loss, layer.p["W"]), atol=1e-5)


def test_maxpool_grads():
    X = RNG.standard_normal((2, 4, 3))
    mask = np.array([[1, 1, 1, 0], [1, 1, 0, 0]], dtype=np.float64)
    layer = MaxPoolNodes()
    dout = RNG.standard_normal((2, 3))

    def loss():
        out, _ = layer.forward(X, mask)
        return float((out * dout).sum())

    out, cache = layer.forward(X, mask)
    dX = layer.backward(cache, dout)
    assert np.allclose(dX, num_grad(loss, X), atol=1e-5)


def test_maxpool_ignores_masked():
    X = np.zeros((1, 3, 2))
    X[0, 2] = 100.0  # masked-out node with huge values
    mask = np.array([[1, 1, 0]], dtype=np.float64)
    layer = MaxPoolNodes()
    out, _ = layer.forward(X, mask)
    assert np.all(out == 0)


def test_dropout_train_eval():
    layer = Dropout(0.5)
    X = np.ones((1000, 4))
    g = np.random.default_rng(1)
    out, cache = layer.forward(X, True, g)
    assert 0.8 < out.mean() < 1.2  # inverted scaling preserves expectation
    assert (out == 0).mean() > 0.3
    out_eval, c2 = layer.forward(X, False, g)
    assert np.array_equal(out_eval, X) and c2 is None


def test_grad_accumulation_across_two_calls():
    """Shared-stack property: two forward/backward passes sum grads."""
    X = RNG.standard_normal((5, 3))
    layer = Linear(3, 2, RNG)
    dout = RNG.standard_normal((5, 2))
    out, c1 = layer.forward(X)
    layer.zero_grads()
    layer.backward(c1, dout)
    once = {k: v.copy() for k, v in layer.g.items()}
    layer.backward(c1, dout)
    for k in once:
        assert np.allclose(layer.g[k], 2 * once[k])
