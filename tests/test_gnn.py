"""Tests for the from-scratch GNN encoder (Eqs. 1–3) and its training."""
import numpy as np
import pytest

from repro.core.gnn import GNN, GraphSample, _sigmoid


def _line_graph(n=4, d_in=6, seed=0, p=None, y=None):
    rng = np.random.default_rng(seed)
    x = rng.normal(0, 1, (n, d_in))
    a_in = np.zeros((n, n))
    a_out = np.zeros((n, n))
    for i in range(n - 1):
        a_in[i + 1, i] = 1.0
        a_out[i, i + 1] = 1.0
    return GraphSample(
        x=x,
        a_in=a_in,
        a_out=a_out,
        p=np.asarray(p) if p is not None else rng.uniform(0, 1, n),
        y_node=np.asarray(y) if y is not None else rng.integers(0, 2, n),
    )


class TestForward:
    def test_output_shape_and_range(self):
        g = GNN(d_in=6, dim=16, seed=0)
        s = _line_graph()
        out = g.predict_proba(s)
        assert out.shape == (4,)
        assert np.all((out >= 0) & (out <= 1))

    def test_embed_shape(self):
        g = GNN(d_in=6, dim=16, seed=0)
        assert g.embed(_line_graph()).shape == (4, 16)

    def test_embedding_is_parallelism_agnostic(self):
        """h_v must not depend on p — parallelism enters only via FUSE."""
        g = GNN(d_in=6, dim=16, seed=0)
        s1 = _line_graph(p=[0.1] * 4)
        s2 = GraphSample(x=s1.x, a_in=s1.a_in, a_out=s1.a_out, p=np.array([0.9] * 4))
        np.testing.assert_array_equal(g.embed(s1), g.embed(s2))

    def test_prediction_depends_on_parallelism(self):
        g = GNN(d_in=6, dim=16, seed=0)
        s1 = _line_graph(p=[0.05] * 4)
        s2 = GraphSample(x=s1.x, a_in=s1.a_in, a_out=s1.a_out, p=np.array([0.95] * 4))
        assert not np.allclose(g.predict_proba(s1), g.predict_proba(s2))

    def test_message_passing_propagates_context(self):
        """Perturbing node 0's features must change node 1's embedding
        (1 hop) and node 2's (2 hops with 2 rounds)."""
        g = GNN(d_in=6, dim=16, rounds=2, seed=0)
        s = _line_graph()
        e1 = g.embed(s)
        x2 = s.x.copy()
        x2[0] += 10.0
        e2 = g.embed(GraphSample(x=x2, a_in=s.a_in, a_out=s.a_out))
        assert not np.allclose(e1[1], e2[1])
        assert not np.allclose(e1[2], e2[2])

    def test_fuse_required_when_enabled(self):
        g = GNN(d_in=6, seed=0)
        s = _line_graph()
        s.p = None
        with pytest.raises(ValueError, match="FUSE"):
            g.forward(s)

    def test_unknown_head_rejected(self):
        with pytest.raises(ValueError):
            GNN(d_in=4, head="triple")


class TestGradients:
    @pytest.mark.parametrize("head,use_fuse", [("node_binary", True), ("graph_reg", False)])
    def test_numerical_gradient_check(self, head, use_fuse):
        """Handwritten backprop must match finite differences."""
        g = GNN(d_in=5, dim=6, hidden=5, head=head, use_fuse=use_fuse, seed=1)
        s = _line_graph(n=3, d_in=5, seed=2)
        if head == "graph_reg":
            s.y_graph = 0.7
        _, grads = g.loss_grads(s)
        eps = 1e-6
        for name in ("W0", "W1", "W2", "Ws0", "Wi1"):
            W = g.params[name]
            i = (0, 0) if W.ndim == 2 else (0,)
            orig = W[i]
            W[i] = orig + eps
            lp, _ = g.loss_grads(s)
            W[i] = orig - eps
            lm, _ = g.loss_grads(s)
            W[i] = orig
            num = (lp - lm) / (2 * eps)
            assert grads[name][i] == pytest.approx(num, rel=1e-3, abs=1e-6), name


class TestTraining:
    def test_loss_decreases(self):
        rng = np.random.default_rng(0)
        samples = [_line_graph(seed=i) for i in range(20)]
        g = GNN(d_in=6, dim=16, seed=0)
        hist = g.fit(samples, epochs=30, lr=3e-3, seed=0)
        assert hist[-1] < hist[0]

    def test_learns_separable_task(self):
        """Label = 1 iff the node's first feature is positive — the GNN
        must reach high accuracy on this trivially separable task."""
        rng = np.random.default_rng(1)
        samples = []
        for i in range(40):
            s = _line_graph(n=5, seed=100 + i)
            s.y_node = (s.x[:, 0] > 0).astype(int)
            samples.append(s)
        g = GNN(d_in=6, dim=16, seed=0)
        g.fit(samples, epochs=80, seed=0)
        assert g.accuracy(samples) > 0.9

    def test_unlabelled_nodes_ignored(self):
        s = _line_graph(y=[-1, -1, -1, -1])
        g = GNN(d_in=6, dim=8, seed=0)
        loss, grads = g.loss_grads(s)
        assert loss == pytest.approx(0.0)
        assert all(np.allclose(v, 0) for v in grads.values())

    def test_pos_weight_set_from_data(self):
        samples = [_line_graph(y=[1, 0, 0, 0], seed=i) for i in range(4)]
        g = GNN(d_in=6, dim=8, seed=0)
        g.fit(samples, epochs=1, seed=0)
        assert g.pos_weight == pytest.approx(3.0)


class TestGraphRegression:
    def test_learns_mean_feature(self):
        rng = np.random.default_rng(2)
        samples = []
        for i in range(60):
            s = _line_graph(n=4, seed=200 + i)
            s = GraphSample(x=s.x, a_in=s.a_in, a_out=s.a_out,
                            y_graph=float(s.x[:, 1].mean()))
            samples.append(s)
        g = GNN(d_in=6, dim=16, head="graph_reg", use_fuse=False, seed=0)
        g.fit(samples, epochs=120, lr=3e-3, seed=0)
        errs = [abs(g.forward(s)[0] - s.y_graph) for s in samples]
        assert np.mean(errs) < 0.2

    def test_single_scalar_output(self):
        g = GNN(d_in=6, dim=8, head="graph_reg", use_fuse=False, seed=0)
        s = _line_graph()
        assert g.forward(s).shape == (1,)


def test_sigmoid_stable():
    assert _sigmoid(np.array([1000.0]))[0] == pytest.approx(1.0)
    assert _sigmoid(np.array([-1000.0]))[0] == pytest.approx(0.0)
