"""Tests for the monotonic fine-tuning models M_f (§IV-B)."""
import numpy as np
import pytest

from repro.core.monotonic import (
    MonotoneGBDT,
    MonotoneSVM,
    PlainNN,
    make_model,
    min_safe_parallelism,
)


def _boundary_data(n=600, d=6, seed=0):
    """Synthetic task: bottleneck iff p < boundary(h), boundary a smooth
    function of the first feature."""
    rng = np.random.default_rng(seed)
    h = rng.normal(0, 1, (n, d))
    boundary = 0.3 + 0.4 * (1 / (1 + np.exp(-h[:, 0])))  # in (0.3, 0.7)
    p = rng.uniform(0, 1, n)
    y = (p < boundary).astype(int)
    return h, p, y, boundary


MODELS = {
    "svm": lambda d: MonotoneSVM(d, seed=0, epochs=60),
    "xgboost": lambda d: MonotoneGBDT(seed=0, n_rounds=30),
    "nn": lambda d: PlainNN(d, seed=0, epochs=150),
}


@pytest.mark.parametrize("kind", ["svm", "xgboost", "nn"])
class TestAllModels:
    def test_fits_and_predicts(self, kind):
        h, p, y, _ = _boundary_data()
        m = MODELS[kind](h.shape[1]).fit(h, p, y)
        acc = (m.predict(h, p) == y).mean()
        assert acc > 0.8, f"{kind} acc={acc}"

    def test_proba_in_unit_interval(self, kind):
        h, p, y, _ = _boundary_data()
        m = MODELS[kind](h.shape[1]).fit(h, p, y)
        pr = m.predict_proba(h[:50], p[:50])
        assert np.all(pr >= 0) and np.all(pr <= 1)

    def test_handles_sample_weight(self, kind):
        h, p, y, _ = _boundary_data(n=200)
        w = np.ones(len(y))
        m = MODELS[kind](h.shape[1]).fit(h, p, y, sample_weight=w)
        assert m.predict(h[:5], p[:5]).shape == (5,)

    def test_handles_imbalance(self, kind):
        """With 5 % positives an unweighted fit collapses to all-0; the
        balanced weighting must keep recall on the positive class."""
        rng = np.random.default_rng(1)
        n = 800
        h = rng.normal(0, 1, (n, 4))
        p = rng.uniform(0, 1, n)
        y = ((p < 0.15) & (h[:, 0] > 0)).astype(int)
        m = MODELS["svm" if kind == "svm" else kind](4) if kind != "svm" else MonotoneSVM(4, seed=0, epochs=60)
        m = MODELS[kind](4).fit(h, p, y)
        pos = y == 1
        if pos.sum() > 5:
            recall = (m.predict(h[pos], p[pos]) == 1).mean()
            assert recall > 0.5, f"{kind} recall={recall}"


@pytest.mark.parametrize("kind", ["svm", "xgboost"])
class TestMonotoneConstraint:
    def test_probability_nonincreasing_in_p(self, kind):
        """The formal constraint: p(h, p1) ≥ p(h, p2) whenever p1 ≤ p2."""
        h, p, y, _ = _boundary_data()
        m = MODELS[kind](h.shape[1]).fit(h, p, y)
        ps = np.linspace(0, 1, 21)
        for row in h[:20]:
            probs = m.predict_proba(np.tile(row, (21, 1)), ps)
            assert np.all(np.diff(probs) <= 1e-9), f"{kind} not monotone"

    def test_is_monotone_flag(self, kind):
        assert MODELS[kind](4).is_monotone


class TestSVMSpecifics:
    def test_wp_nonpositive(self):
        h, p, y, _ = _boundary_data()
        m = MonotoneSVM(h.shape[1], seed=0, epochs=30).fit(h, p, y)
        assert m.w_p <= 0.0


class TestGBDTSpecifics:
    def test_monotone_even_with_adversarial_labels(self):
        """Labels that *reward* non-monotone behaviour must still produce
        a monotone ensemble (violating splits get gain −∞)."""
        rng = np.random.default_rng(2)
        n = 400
        h = rng.normal(0, 1, (n, 3))
        p = rng.uniform(0, 1, n)
        y = ((p > 0.4) & (p < 0.6)).astype(int)  # bump in the middle
        m = MonotoneGBDT(seed=0, n_rounds=20).fit(h, p, y)
        ps = np.linspace(0, 1, 31)
        for row in h[:10]:
            probs = m.predict_proba(np.tile(row, (31, 1)), ps)
            assert np.all(np.diff(probs) <= 1e-9)


class TestPlainNN:
    def test_not_monotone_flag(self):
        assert not PlainNN(4).is_monotone

    def test_can_learn_nonmonotone_shape(self):
        """The ablation's point: the NN *can* fit a non-monotone response,
        which is what breaks its boundary search."""
        rng = np.random.default_rng(3)
        n = 600
        h = np.zeros((n, 2))
        p = rng.uniform(0, 1, n)
        y = ((p > 0.4) & (p < 0.7)).astype(int)
        m = PlainNN(2, seed=0, epochs=400).fit(h, p, y)
        probs = m.predict_proba(np.zeros((31, 2)), np.linspace(0, 1, 31))
        assert np.any(np.diff(probs) > 1e-6)  # goes up somewhere


class TestFactory:
    def test_known_kinds(self):
        assert isinstance(make_model("svm", 4), MonotoneSVM)
        assert isinstance(make_model("xgboost", 4), MonotoneGBDT)
        assert isinstance(make_model("nn", 4), PlainNN)

    def test_unknown_kind(self):
        with pytest.raises(ValueError):
            make_model("forest", 4)


class TestMinSafeParallelism:
    class _Step:
        """Safe iff p ≥ boundary."""

        is_monotone = True

        def __init__(self, boundary):
            self.boundary = boundary

        def predict_proba(self, h, p):
            return np.where(np.asarray(p) >= self.boundary, 0.0, 1.0)

    def test_binary_search_finds_boundary(self):
        m = self._Step(boundary=0.37)
        p = min_safe_parallelism(m, np.zeros(3), 100, lambda q: q / 100.0)
        assert p == 37

    def test_all_unsafe_returns_pmax(self):
        m = self._Step(boundary=2.0)
        assert min_safe_parallelism(m, np.zeros(3), 50, lambda q: q / 100.0) == 50

    def test_all_safe_returns_one(self):
        m = self._Step(boundary=0.0)
        assert min_safe_parallelism(m, np.zeros(3), 50, lambda q: q / 100.0) == 1

    def test_linear_scan_for_nonmonotone(self):
        class Bumpy:
            is_monotone = False

            def predict_proba(self, h, p):
                q = np.asarray(p)
                return np.where((q > 0.05) & (q < 0.2), 1.0, 0.0)

        p = min_safe_parallelism(Bumpy(), np.zeros(2), 100, lambda q: q / 100.0)
        assert p == 1  # scan stops at the first hole — the NN failure mode
