"""R-GCN tests: shapes, normalization, learning, and a finite-difference
gradient check of the manual backprop."""
import numpy as np
import pytest

from repro.core.rgcn import RGCN, Graph, build_graph


def _toy_graph(n=6, d=5, n_rel=3, seed=0):
    rng = np.random.default_rng(seed)
    x = rng.normal(size=(n, d))
    edges = []
    for _ in range(12):
        a, b = rng.integers(0, n, 2)
        if a != b:
            edges.append((int(a), int(b), int(rng.integers(0, n_rel))))
    return build_graph(x, edges, n_rel)


def test_adjacency_row_normalized():
    g = _toy_graph()
    for a in g.adj:
        sums = a.sum(axis=1)
        for s in sums:
            assert s == pytest.approx(0.0) or s == pytest.approx(1.0)


def test_forward_shapes_and_probs():
    g = _toy_graph()
    m = RGCN(5, 3, 2, d_hidden=8, n_layers=3, n_bases=2, seed=1)
    probs, _ = m.forward(g)
    assert probs.shape == (6, 2)
    assert np.allclose(probs.sum(axis=1), 1.0)
    assert (probs >= 0).all()


def test_gradient_check_finite_difference():
    """Manual backprop must match numeric gradients to ~1e-6."""
    g = _toy_graph(n=5, d=4, n_rel=2, seed=3)
    m = RGCN(4, 2, 2, d_hidden=6, n_layers=3, n_bases=2, seed=2)
    labels = np.array([0, 1, 0, 1, 1])

    _, cache = m.forward(g)
    loss, grads = m.backward(g, cache, labels)

    eps = 1e-6
    for key in ["V0", "a1", "W0_2", "V2", "a0", "W0_0"]:
        p = m.params[key]
        it = np.nditer(p, flags=["multi_index"])
        checked = 0
        while not it.finished and checked < 6:
            idx = it.multi_index
            orig = p[idx]
            p[idx] = orig + eps
            lp = _loss_of(m, g, labels)
            p[idx] = orig - eps
            lm = _loss_of(m, g, labels)
            p[idx] = orig
            num = (lp - lm) / (2 * eps)
            ana = grads[key][idx]
            assert num == pytest.approx(ana, abs=1e-5), f"{key}{idx}"
            checked += 1
            it.iternext()


def _loss_of(m, g, labels):
    probs, _ = m.forward(g)
    n = len(labels)
    return float(-np.log(probs[np.arange(n), labels] + 1e-12).sum() / n)


def test_fit_reduces_loss():
    rng = np.random.default_rng(0)
    graphs, labels = [], []
    for s in range(10):
        g = _toy_graph(n=8, d=5, n_rel=3, seed=s)
        # Learnable rule: label = feature 0 above 0.
        y = (g.x[:, 0] > 0).astype(int)
        graphs.append(g)
        labels.append(y)
    m = RGCN(5, 3, 2, d_hidden=8, n_layers=3, n_bases=2, seed=0)
    hist = m.fit(graphs, labels, epochs=30, lr=1e-2, seed=0)
    assert hist[-1] < hist[0] * 0.5


def test_fit_learns_feature_rule():
    graphs, labels = [], []
    for s in range(20):
        g = _toy_graph(n=8, d=5, n_rel=3, seed=100 + s)
        labels.append((g.x[:, 1] > 0).astype(int))
        graphs.append(g)
    m = RGCN(5, 3, 2, d_hidden=8, n_layers=2, n_bases=2, seed=1)
    m.fit(graphs, labels, epochs=40, lr=1e-2, seed=1)
    correct = total = 0
    for g, y in zip(graphs, labels):
        pred = m.predict(g).argmax(axis=1)
        correct += int((pred == y).sum())
        total += len(y)
    assert correct / total > 0.9


def test_state_roundtrip():
    g = _toy_graph()
    m = RGCN(5, 3, 2, d_hidden=8, n_layers=3, n_bases=2, seed=4)
    m2 = RGCN.from_state(m.state())
    p1 = m.predict(g)
    p2 = m2.predict(g)
    assert np.allclose(p1, p2)


def test_state_is_copy():
    m = RGCN(5, 3, 2, d_hidden=8, n_layers=2, n_bases=2, seed=4)
    st = m.state()
    st["params"]["W0_0"][:] = 0
    assert not np.allclose(m.params["W0_0"], 0)


def test_weighted_loss_changes_gradient():
    g = _toy_graph(n=5, d=4, n_rel=2, seed=5)
    m = RGCN(4, 2, 2, d_hidden=6, n_layers=2, n_bases=2, seed=5)
    labels = np.array([0, 1, 0, 1, 0])
    _, cache = m.forward(g)
    _, g1 = m.backward(g, cache, labels)
    _, cache = m.forward(g)
    _, g2 = m.backward(g, cache, labels, np.array([1, 5, 1, 5, 1.0]))
    assert not np.allclose(g1["W0_0"], g2["W0_0"])


def test_empty_relation_graph():
    x = np.ones((3, 4))
    g = build_graph(x, [], 2)
    m = RGCN(4, 2, 2, d_hidden=4, n_layers=2, n_bases=2, seed=0)
    probs, _ = m.forward(g)
    assert probs.shape == (3, 2)
