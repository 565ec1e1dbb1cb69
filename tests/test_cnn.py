"""Tests for the from-scratch CommCNN, including numerical gradient
checks of every layer's backward pass."""
import numpy as np
import pytest

from repro.ml.cnn import (
    BatchNorm2D,
    CNNConfig,
    CommCNN,
    Conv2D,
    Dense,
    GlobalMaxAvgPool,
    MaxPool2x2,
    ReLU,
    _col2im,
    _im2col,
)

RNG = np.random.default_rng(0)


def _num_grad(f, x, eps=1e-5):
    g = np.zeros_like(x)
    it = np.nditer(x, flags=["multi_index"])
    for _ in it:
        i = it.multi_index
        old = x[i]
        x[i] = old + eps
        fp = f()
        x[i] = old - eps
        fm = f()
        x[i] = old
        g[i] = (fp - fm) / (2 * eps)
    return g


def test_im2col_col2im_adjoint():
    """<im2col(X), C> == <X, col2im(C)> — the pair must be adjoint."""
    X = RNG.normal(size=(2, 3, 5, 4))
    C = RNG.normal(size=(2, 3 * 2 * 2, 4 * 3))
    lhs = (_im2col(X, 2, 2) * C).sum()
    rhs = (X * _col2im(C, X.shape, 2, 2)).sum()
    assert lhs == pytest.approx(rhs)


@pytest.mark.parametrize("kh,kw,pad", [(3, 3, 1), (1, 4, 0), (5, 1, 0)])
def test_conv2d_gradients(kh, kw, pad):
    rng = np.random.default_rng(1)
    conv = Conv2D(2, 3, kh, kw, pad=pad, rng=rng)
    X = rng.normal(size=(2, 2, 5, 4))
    W_out = rng.normal(size=(2, 3, 5 - kh + 1 + 2 * pad, 4 - kw + 1 + 2 * pad))

    def loss():
        return (conv.forward(X.copy()) * W_out).sum()

    conv.dW[:] = 0
    conv.db[:] = 0
    out = conv.forward(X.copy())
    dX = conv.backward(W_out)
    assert np.allclose(_num_grad(loss, conv.W), conv.dW, atol=1e-4)
    assert np.allclose(_num_grad(loss, conv.b), conv.db, atol=1e-4)
    assert np.allclose(_num_grad(loss, X), dX, atol=1e-4)


def test_relu_gradient():
    r = ReLU()
    X = RNG.normal(size=(3, 4))
    out = r.forward(X)
    d = r.backward(np.ones_like(out))
    assert np.array_equal(d, (X > 0).astype(float))


def test_maxpool_gradient():
    mp = MaxPool2x2()
    X = RNG.normal(size=(2, 2, 4, 4))
    W_out = RNG.normal(size=(2, 2, 2, 2))

    def loss():
        return (MaxPool2x2().forward(X) * W_out).sum()

    mp.forward(X)
    dX = mp.backward(W_out)
    assert np.allclose(_num_grad(loss, X), dX, atol=1e-4)


def test_maxpool_odd_dims_dropped():
    X = RNG.normal(size=(1, 1, 5, 3))
    out = MaxPool2x2().forward(X)
    assert out.shape == (1, 1, 2, 1)


def test_globalpool_gradient():
    gp = GlobalMaxAvgPool()
    X = RNG.normal(size=(2, 3, 4, 2))
    W_out = RNG.normal(size=(2, 6))

    def loss():
        return (GlobalMaxAvgPool().forward(X) * W_out).sum()

    gp.forward(X)
    dX = gp.backward(W_out)
    assert np.allclose(_num_grad(loss, X), dX, atol=1e-4)


def test_globalpool_output_is_max_and_mean():
    X = RNG.normal(size=(1, 2, 3, 3))
    out = GlobalMaxAvgPool().forward(X)
    assert out[0, 0] == pytest.approx(X[0, 0].max())
    assert out[0, 2] == pytest.approx(X[0, 0].mean())


def test_dense_gradients():
    rng = np.random.default_rng(2)
    d = Dense(4, 3, rng)
    X = rng.normal(size=(5, 4))
    W_out = rng.normal(size=(5, 3))

    def loss():
        return (d.forward(X) * W_out).sum()

    d.dW[:] = 0
    d.db[:] = 0
    d.forward(X)
    dX = d.backward(W_out)
    assert np.allclose(_num_grad(loss, d.W), d.dW, atol=1e-5)
    assert np.allclose(_num_grad(loss, d.b), d.db, atol=1e-5)
    assert np.allclose(_num_grad(loss, X), dX, atol=1e-5)


def test_batchnorm_gradient():
    bn = BatchNorm2D(2)
    X = RNG.normal(size=(3, 2, 2, 2))
    W_out = RNG.normal(size=(3, 2, 2, 2))

    def loss():
        b2 = BatchNorm2D(2)
        b2.W[:] = bn.W
        b2.b[:] = bn.b
        return (b2.forward(X) * W_out).sum()

    bn.dW[:] = 0
    bn.db[:] = 0
    bn.forward(X)
    dX = bn.backward(W_out)
    assert np.allclose(_num_grad(loss, X), dX, atol=1e-4)
    assert np.allclose(_num_grad(loss, bn.W), bn.dW, atol=1e-4)
    assert np.allclose(_num_grad(loss, bn.b), bn.db, atol=1e-4)


def test_batchnorm_inference_uses_running_stats():
    bn = BatchNorm2D(1, momentum=0.0)  # running stats = last batch
    X = np.arange(8.0).reshape(2, 1, 2, 2)
    bn.training = True
    bn.forward(X)
    bn.training = False
    out = bn.forward(np.zeros_like(X))
    expect = (0 - X.mean()) / np.sqrt(X.var() + bn.eps)
    assert np.allclose(out, expect, atol=1e-6)


def _toy_dataset(n=120, k=10, w=6, seed=3):
    g = np.random.default_rng(seed)
    X = g.normal(0, 0.5, (n, k, w))
    y = g.integers(0, 3, n)
    for i in range(n):
        X[i, :, y[i] * 2] += 2.0  # class-dependent column activation
    return X, y


def test_commcnn_learns_toy_problem():
    X, y = _toy_dataset()
    cfg = CNNConfig(k=10, width=6, epochs=25, channels=4, row_channels=8,
                    col_channels=4, hidden=16, row_dropout=0.0, seed=0)
    m = CommCNN(cfg).fit(X, y)
    assert (m.predict(X) == y).mean() > 0.9


def test_commcnn_proba_valid():
    X, y = _toy_dataset(n=40)
    cfg = CNNConfig(k=10, width=6, epochs=3, channels=2, row_channels=4,
                    col_channels=2, hidden=8, seed=0)
    m = CommCNN(cfg).fit(X, y)
    P = m.predict_proba(X)
    assert P.shape == (40, 3)
    assert np.allclose(P.sum(axis=1), 1.0)


def test_commcnn_deterministic():
    X, y = _toy_dataset(n=60)
    cfg = CNNConfig(k=10, width=6, epochs=4, channels=2, row_channels=4,
                    col_channels=2, hidden=8, seed=5)
    a = CommCNN(cfg).fit(X, y).predict_proba(X)
    b = CommCNN(cfg).fit(X, y).predict_proba(X)
    assert np.allclose(a, b)


def test_commcnn_param_roundtrip():
    X, y = _toy_dataset(n=60)
    cfg = CNNConfig(k=10, width=6, epochs=4, channels=2, row_channels=4,
                    col_channels=2, hidden=8, seed=0)
    m = CommCNN(cfg).fit(X, y)
    m2 = CommCNN.from_params(m.get_params())
    assert np.allclose(m.predict_proba(X), m2.predict_proba(X))


def test_commcnn_zero_padding_tolerated():
    """Matrices with fewer than k live rows (zero-padded) must flow."""
    X, y = _toy_dataset(n=30)
    X[:, 5:, :] = 0.0
    cfg = CNNConfig(k=10, width=6, epochs=2, channels=2, row_channels=4,
                    col_channels=2, hidden=8, seed=0)
    m = CommCNN(cfg).fit(X, y)
    assert np.isfinite(m.predict_proba(X)).all()
