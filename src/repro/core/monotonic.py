"""Fine-tuning prediction models M_f with the monotonic constraint
(paper §IV-B).

Input is x = [h, p]: the parallelism-agnostic operator embedding h from
the frozen GNN encoder, plus the (scaled) parallelism degree p. Class 1
means "bottleneck". The monotonic constraint requires P(y=1 | h, p) to be
non-increasing in p — increasing parallelism can only reduce bottleneck
likelihood.

Three models, all from scratch in numpy (no sklearn/xgboost offline):

* :class:`MonotoneSVM` — Eq. 5: hinge loss with an RBF feature map on h
  (random Fourier features stand in for the kernel trick) and a *linear*
  term w_p·p constrained to w_p ≤ 0 by projection after every step.
* :class:`MonotoneGBDT` — XGBoost-style gradient boosting where splits on
  the parallelism feature that violate monotonicity get gain −∞ and leaf
  values are clipped to bound intervals propagated down the tree.
* :class:`PlainNN` — an unconstrained MLP, the ablation's NN baseline
  (Fig. 11a): it can (and does) learn locally non-monotone responses.

:func:`min_safe_parallelism` is Algorithm 2 line 8: the smallest p whose
prediction is non-bottleneck — a binary search when the model is
monotone, a linear scan otherwise.
"""
from __future__ import annotations

import numpy as np


def _sigmoid(x):
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


def _balanced_weights(y: np.ndarray, sample_weight: np.ndarray | None) -> np.ndarray:
    """Class-balanced per-sample weights (optionally composed with caller
    weights). Bottleneck labels are heavily imbalanced — most historical
    deployments are over-provisioned — so unweighted fits collapse to the
    majority 'never a bottleneck' answer."""
    w = np.ones(len(y)) if sample_weight is None else np.asarray(sample_weight, float).copy()
    n_pos = max(1, int((y > 0).sum()))
    n_neg = max(1, int((y <= 0).sum()))
    n = len(y)
    w = w * np.where(y > 0, n / (2.0 * n_pos), n / (2.0 * n_neg))
    return w


class MonotoneSVM:
    """Linear-in-p, RFF-kernelised-in-h SVM with w_p ≤ 0 (Eq. 5)."""

    is_monotone = True

    def __init__(
        self,
        d: int,
        *,
        rff_dim: int = 128,
        gamma: float | None = None,
        lam: float = 1e-3,
        epochs: int = 100,
        lr: float = 0.05,
        p_scale: float = 16.0,
        seed: int = 0,
    ) -> None:
        self.d = d
        self.gamma = gamma  # None → sharpened median heuristic at fit time
        #: Internal magnification of the parallelism feature. The scaled
        #: p lives in [0, ~0.6]; without magnification the hinge
        #: subgradient on w_p is tiny and the learned slope is too flat,
        #: which inflates the predicted bottleneck boundary.
        self.p_scale = p_scale
        self.rff_dim, self.lam, self.epochs, self.lr = rff_dim, lam, epochs, lr
        self.omega = np.zeros((d, rff_dim))
        self.beta = np.zeros(rff_dim)
        self.mu = np.zeros(d)
        self.sd = np.ones(d)
        self.w_e = np.zeros(rff_dim)
        self.w_p = 0.0
        self.b = 0.0
        self._seed = seed

    def _phi(self, h: np.ndarray) -> np.ndarray:
        z = (h - self.mu) / self.sd
        return np.sqrt(2.0 / self.rff_dim) * np.cos(z @ self.omega + self.beta)

    def _prepare(self, h: np.ndarray) -> None:
        """Standardise the embedding space and pick the RBF bandwidth by
        the median-distance heuristic, then draw the Fourier features."""
        self.mu = h.mean(axis=0)
        self.sd = h.std(axis=0)
        self.sd[self.sd < 1e-8] = 1.0
        z = (h - self.mu) / self.sd
        rng = np.random.default_rng(self._seed)
        if self.gamma is None:
            n = len(z)
            idx = rng.choice(n, size=min(128, n), replace=False)
            sub = z[idx]
            d2 = ((sub[:, None, :] - sub[None, :, :]) ** 2).sum(-1)
            med = float(np.median(d2[d2 > 0])) if (d2 > 0).any() else 1.0
            # Sharper than the plain median heuristic: bottleneck
            # boundaries are local in embedding space.
            gamma = 10.0 / max(med, 1e-6)
        else:
            gamma = self.gamma
        self.omega = rng.normal(0, np.sqrt(2 * gamma), size=(self.d, self.rff_dim))
        self.beta = rng.uniform(0, 2 * np.pi, size=self.rff_dim)

    def fit(
        self,
        h: np.ndarray,
        p: np.ndarray,
        y: np.ndarray,
        sample_weight: np.ndarray | None = None,
    ) -> "MonotoneSVM":
        """Projected subgradient descent on the (class-balanced, weighted)
        hinge objective; the projection w_p ← min(w_p, 0) enforces the
        monotonic constraint."""
        self._prepare(np.asarray(h))
        phi = self._phi(h)
        p = np.asarray(p) * self.p_scale
        t = np.where(np.asarray(y) > 0, 1.0, -1.0)
        w = _balanced_weights(np.asarray(y), sample_weight)
        rng = np.random.default_rng(self._seed + 1)
        n = len(t)
        idx = np.arange(n)
        for ep in range(self.epochs):
            rng.shuffle(idx)
            lr = self.lr / (1.0 + 0.01 * ep)
            for i in idx:
                margin = t[i] * (phi[i] @ self.w_e + self.w_p * p[i] + self.b)
                # regularisation subgradient
                gw = self.lam * self.w_e
                gp = self.lam * self.w_p
                gb = 0.0
                if margin < 1.0:
                    gw = gw - w[i] * t[i] * phi[i]
                    gp = gp - w[i] * t[i] * p[i]
                    gb = -w[i] * t[i]
                self.w_e -= lr * gw
                self.w_p -= lr * gp
                self.b -= lr * gb
                self.w_p = min(self.w_p, 0.0)  # monotonic projection
        return self

    def decision(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        h = np.atleast_2d(h)
        return (
            self._phi(h) @ self.w_e
            + self.w_p * np.asarray(p) * self.p_scale
            + self.b
        )

    def predict_proba(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        return _sigmoid(2.0 * self.decision(h, p))

    def predict(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        return (self.decision(h, p) > 0).astype(int)


class _TreeNode:
    __slots__ = ("feature", "threshold", "left", "right", "value")

    def __init__(self):
        self.feature = -1
        self.threshold = 0.0
        self.left = None
        self.right = None
        self.value = 0.0

    def predict(self, X: np.ndarray) -> np.ndarray:
        if self.left is None:
            return np.full(len(X), self.value)
        mask = X[:, self.feature] <= self.threshold
        out = np.empty(len(X))
        out[mask] = self.left.predict(X[mask])
        out[~mask] = self.right.predict(X[~mask])
        return out


class MonotoneGBDT:
    """Gradient-boosted trees with a decreasing-monotone constraint on
    the parallelism feature (the last column), XGBoost-style."""

    is_monotone = True

    def __init__(
        self,
        *,
        n_rounds: int = 40,
        max_depth: int = 4,
        eta: float = 0.3,
        lam: float = 1.0,
        min_child: float = 1e-3,
        colsample: float = 0.35,
        seed: int = 0,
    ) -> None:
        self.n_rounds, self.max_depth, self.eta = n_rounds, max_depth, eta
        self.lam, self.min_child = lam, min_child
        #: Fraction of embedding features examined per tree (the
        #: parallelism feature is always included) — XGBoost's
        #: colsample_bytree, which also keeps the pure-python split
        #: search fast.
        self.colsample = colsample
        self._rng = np.random.default_rng(seed)
        self.trees: list[_TreeNode] = []
        self.base = 0.0

    # -- tree construction -------------------------------------------------
    def _leaf_value(self, g: float, hs: float, lo: float, hi: float) -> float:
        return float(np.clip(-g / (hs + self.lam), lo, hi))

    def _build(self, X, g, h, depth, lo, hi, p_idx, feats) -> _TreeNode:
        node = _TreeNode()
        node.value = self._leaf_value(g.sum(), h.sum(), lo, hi)
        if depth >= self.max_depth or len(X) < 4:
            return node
        best_gain = 1e-6
        best = None
        parent_score = (g.sum() ** 2) / (h.sum() + self.lam)
        for f in feats:
            xs = np.unique(X[:, f])
            if len(xs) < 2:
                continue
            cands = (xs[:-1] + xs[1:]) / 2.0
            if len(cands) > 8:
                cands = np.quantile(cands, np.linspace(0.05, 0.95, 8))
            for thr in cands:
                mask = X[:, f] <= thr
                gl, hl = g[mask].sum(), h[mask].sum()
                gr, hr = g[~mask].sum(), h[~mask].sum()
                if hl < self.min_child or hr < self.min_child:
                    continue
                if f == p_idx:
                    wl = self._leaf_value(gl, hl, lo, hi)
                    wr = self._leaf_value(gr, hr, lo, hi)
                    if wl < wr:  # violates decreasing monotonicity: gain −∞
                        continue
                gain = (
                    gl**2 / (hl + self.lam)
                    + gr**2 / (hr + self.lam)
                    - parent_score
                )
                if gain > best_gain:
                    best_gain = gain
                    best = (f, thr, mask)
        if best is None:
            return node
        f, thr, mask = best
        node.feature, node.threshold = f, float(thr)
        if f == p_idx:
            wl = self._leaf_value(g[mask].sum(), h[mask].sum(), lo, hi)
            wr = self._leaf_value(g[~mask].sum(), h[~mask].sum(), lo, hi)
            mid = 0.5 * (wl + wr)
            node.left = self._build(X[mask], g[mask], h[mask], depth + 1, mid, hi, p_idx, feats)
            node.right = self._build(X[~mask], g[~mask], h[~mask], depth + 1, lo, mid, p_idx, feats)
        else:
            node.left = self._build(X[mask], g[mask], h[mask], depth + 1, lo, hi, p_idx, feats)
            node.right = self._build(X[~mask], g[~mask], h[~mask], depth + 1, lo, hi, p_idx, feats)
        return node

    # -- boosting ------------------------------------------------------------
    def fit(
        self,
        h: np.ndarray,
        p: np.ndarray,
        y: np.ndarray,
        sample_weight: np.ndarray | None = None,
    ) -> "MonotoneGBDT":
        X = np.column_stack([h, p])
        y = np.asarray(y, dtype=float)
        w = _balanced_weights(y, sample_weight)
        pos = float(np.clip((w * y).sum() / w.sum(), 1e-3, 1 - 1e-3))
        self.base = float(np.log(pos / (1 - pos)))
        f = np.full(len(y), self.base)
        p_idx = X.shape[1] - 1
        self.trees = []
        n_emb = X.shape[1] - 1
        n_take = max(4, int(np.ceil(self.colsample * n_emb)))
        for _ in range(self.n_rounds):
            prob = _sigmoid(f)
            grad = w * (prob - y)
            hess = np.maximum(w * prob * (1 - prob), 1e-6)
            feats = list(self._rng.choice(n_emb, size=min(n_take, n_emb), replace=False))
            feats.append(p_idx)  # the constrained feature is always in
            tree = self._build(X, grad, hess, 0, -4.0, 4.0, p_idx, feats)
            self.trees.append(tree)
            f = f + self.eta * tree.predict(X)
        return self

    def decision(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        X = np.column_stack([np.atleast_2d(h), np.atleast_1d(p)])
        f = np.full(len(X), self.base)
        for tree in self.trees:
            f = f + self.eta * tree.predict(X)
        return f

    def predict_proba(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        return _sigmoid(self.decision(h, p))

    def predict(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        return (self.decision(h, p) > 0).astype(int)


class PlainNN:
    """Unconstrained 2-layer MLP on [h, p] — the Fig. 11a NN ablation.
    Nothing enforces monotonicity in p, so its bottleneck-boundary search
    can (and in the ablation does) stop at unsafe parallelisms."""

    is_monotone = False

    def __init__(self, d: int, *, hidden: int = 32, epochs: int = 200, lr: float = 1e-2, seed: int = 0) -> None:
        rng = np.random.default_rng(seed)
        self.W1 = rng.normal(0, np.sqrt(2.0 / (d + 1)), (d + 1, hidden))
        self.b1 = np.zeros(hidden)
        self.W2 = rng.normal(0, np.sqrt(2.0 / hidden), (hidden, 1))
        self.b2 = np.zeros(1)
        self.epochs, self.lr = epochs, lr

    def _forward(self, X):
        pre1 = X @ self.W1 + self.b1
        u = np.maximum(pre1, 0)
        out = u @ self.W2 + self.b2
        return pre1, u, out.ravel()

    def fit(
        self,
        h: np.ndarray,
        p: np.ndarray,
        y: np.ndarray,
        sample_weight: np.ndarray | None = None,
    ) -> "PlainNN":
        X = np.column_stack([h, p])
        y = np.asarray(y, dtype=float)
        w = _balanced_weights(y, sample_weight)
        w = w / w.sum()
        m = {k: 0.0 for k in ("W1", "b1", "W2", "b2")}
        v = {k: 0.0 for k in ("W1", "b1", "W2", "b2")}
        t = 0
        for _ in range(self.epochs):
            pre1, u, logit = self._forward(X)
            prob = _sigmoid(logit)
            dlogit = (w * (prob - y)).reshape(-1, 1)
            grads = {
                "W2": u.T @ dlogit,
                "b2": dlogit.sum(axis=0),
            }
            du = dlogit @ self.W2.T
            dpre1 = du * (pre1 > 0)
            grads["W1"] = X.T @ dpre1
            grads["b1"] = dpre1.sum(axis=0)
            t += 1
            for k, g in grads.items():
                m[k] = 0.9 * m[k] + 0.1 * g
                v[k] = 0.999 * v[k] + 0.001 * g * g
                mh = m[k] / (1 - 0.9**t)
                vh = v[k] / (1 - 0.999**t)
                setattr(self, k, getattr(self, k) - self.lr * mh / (np.sqrt(vh) + 1e-8))
        return self

    def decision(self, h: np.ndarray, p: np.ndarray) -> np.ndarray:
        X = np.column_stack([np.atleast_2d(h), np.atleast_1d(p)])
        return self._forward(X)[2]

    def predict_proba(self, h, p):
        return _sigmoid(self.decision(h, p))

    def predict(self, h, p):
        return (self.decision(h, p) > 0).astype(int)


def make_model(kind: str, d: int, *, seed: int = 0):
    """Factory for the fine-tuning model M_f."""
    if kind == "svm":
        return MonotoneSVM(d, seed=seed)
    if kind == "xgboost":
        return MonotoneGBDT(seed=seed)
    if kind == "nn":
        return PlainNN(d, seed=seed)
    raise ValueError(f"unknown fine-tune model {kind!r}")


def min_safe_parallelism(
    model, h: np.ndarray, p_max: int, scale, *, threshold: float = 0.5
) -> int:
    """Algorithm 2, line 8: min{p ≤ p_max | M_f(h, p) = 0}.

    Binary search when the model is monotone (the paper's key use of the
    constraint); linear scan otherwise. Returns p_max when no safe p is
    predicted. ``scale`` maps raw p to the model's feature space.
    """
    h2 = np.atleast_2d(h)

    def is_safe(p: int) -> bool:
        return float(model.predict_proba(h2, np.array([scale(p)]))[0]) <= threshold

    if getattr(model, "is_monotone", False):
        lo, hi = 1, p_max
        if not is_safe(hi):
            return p_max
        while lo < hi:
            mid = (lo + hi) // 2
            if is_safe(mid):
                hi = mid
            else:
                lo = mid + 1
        return lo
    for p in range(1, p_max + 1):
        if is_safe(p):
            return p
    return p_max
