"""GNN-based encoder for dataflow DAGs (paper §IV-A), from scratch.

A directed message-passing network (Eqs. 1–2): at each round a node
combines its own representation with mean-aggregated messages from its
in- and out-neighbours (upstream and downstream operators). After the
final round the **parallelism-agnostic** embedding h_v is produced; the
FUSE update (Eq. 3) then concatenates the scaled parallelism degree and
applies a non-linear projection back to the embedding width, yielding
the parallelism-aware vector fed to a two-layer MLP + sigmoid that
predicts the operator-level bottleneck indicator.

The same machinery doubles as ZeroTune's *job-level* cost model
(``head="graph_reg"``): mean-pool all node embeddings into a summary
vector and regress a scalar metric — exactly the aggregation the paper
criticises for losing operator-level detail.

Implementation: dense numpy with handwritten backprop and Adam — the
DAGs have < 20 nodes, so dense is faster than any sparse machinery, and
the container has no deep-learning framework (DESIGN.md §1).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class GraphSample:
    """One deployed dataflow: node features (topo order), normalised
    adjacency, scaled parallelisms, and labels (node-level bottleneck
    indicators with −1 = unlabelled, and/or a graph-level scalar)."""

    x: np.ndarray  # [n, d_in]
    a_in: np.ndarray  # [n, n]
    a_out: np.ndarray  # [n, n]
    p: np.ndarray | None = None  # [n], scaled to [0,1]
    y_node: np.ndarray | None = None  # [n], values in {-1, 0, 1}
    y_graph: float | None = None


def _relu(x: np.ndarray) -> np.ndarray:
    return np.maximum(x, 0.0)


def _sigmoid(x: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(x, -30, 30)))


class GNN:
    """Directed MPNN encoder + (node-classification | graph-regression)
    head, trained with Adam on handwritten gradients."""

    def __init__(
        self,
        d_in: int,
        *,
        dim: int = 32,
        hidden: int = 32,
        rounds: int = 2,
        use_fuse: bool = True,
        head: str = "node_binary",
        seed: int = 0,
    ) -> None:
        if head not in ("node_binary", "graph_reg"):
            raise ValueError(f"unknown head {head!r}")
        self.d_in, self.dim, self.hidden = d_in, dim, hidden
        self.rounds, self.use_fuse, self.head = rounds, use_fuse, head
        rng = np.random.default_rng(seed)

        def g(*shape):
            return rng.normal(0, np.sqrt(2.0 / shape[0]), shape)

        self.params: dict[str, np.ndarray] = {
            "W0": g(d_in, dim),
            "b0": np.zeros(dim),
        }
        for t in range(rounds):
            self.params[f"Ws{t}"] = g(dim, dim)
            self.params[f"Wi{t}"] = g(dim, dim)
            self.params[f"Wo{t}"] = g(dim, dim)
            self.params[f"b{t}_mp"] = np.zeros(dim)
        if use_fuse:
            self.params["Wf"] = g(dim + 1, dim)
            self.params["bf"] = np.zeros(dim)
        self.params["W1"] = g(dim, hidden)
        self.params["b1"] = np.zeros(hidden)
        self.params["W2"] = g(hidden, 1)
        self.params["b2"] = np.zeros(1)
        self._adam_m = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._adam_v = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._adam_t = 0
        #: Positive-class weight for node_binary BCE; set by fit().
        self.pos_weight = 1.0

    # -- forward ---------------------------------------------------------
    def _encode(self, s: GraphSample) -> tuple[np.ndarray, list]:
        """Message passing → parallelism-agnostic embeddings H (Eqs. 1–2)."""
        P = self.params
        cache: list = []
        pre0 = s.x @ P["W0"] + P["b0"]
        h = _relu(pre0)
        cache.append(("in", s.x, pre0))
        for t in range(self.rounds):
            msg_i = s.a_in @ h
            msg_o = s.a_out @ h
            pre = h @ P[f"Ws{t}"] + msg_i @ P[f"Wi{t}"] + msg_o @ P[f"Wo{t}"] + P[f"b{t}_mp"]
            nh = _relu(pre)
            cache.append(("mp", t, h, msg_i, msg_o, pre))
            h = nh
        return h, cache

    def embed(self, s: GraphSample) -> np.ndarray:
        """Parallelism-agnostic operator embeddings h_v (used by the
        fine-tuning phase; encoder weights are frozen there)."""
        h, _ = self._encode(s)
        return h

    def _head_forward(self, h: np.ndarray, s: GraphSample) -> tuple[np.ndarray, dict]:
        P = self.params
        c: dict = {}
        z = h
        if self.use_fuse:
            if s.p is None:
                raise ValueError("sample lacks parallelism for FUSE")
            cat = np.concatenate([h, s.p.reshape(-1, 1)], axis=1)
            preF = cat @ P["Wf"] + P["bf"]
            z = _relu(preF)
            c["cat"], c["preF"] = cat, preF
        if self.head == "graph_reg":
            zp = z.mean(axis=0, keepdims=True)  # summary vector (ZeroTune)
            c["pool_n"] = z.shape[0]
        else:
            zp = z
        pre1 = zp @ P["W1"] + P["b1"]
        u = _relu(pre1)
        out = u @ P["W2"] + P["b2"]
        c["z"], c["zp"], c["pre1"], c["u"] = z, zp, pre1, u
        return out, c

    def forward(self, s: GraphSample) -> np.ndarray:
        h, _ = self._encode(s)
        out, _ = self._head_forward(h, s)
        if self.head == "node_binary":
            return _sigmoid(out).ravel()
        return out.ravel()[0:1]

    def predict_proba(self, s: GraphSample) -> np.ndarray:
        """Per-operator bottleneck probability (node_binary head)."""
        assert self.head == "node_binary"
        return self.forward(s)

    # -- loss + handwritten gradients -------------------------------------
    def loss_grads(self, s: GraphSample) -> tuple[float, dict[str, np.ndarray]]:
        P = self.params
        h, enc_cache = self._encode(s)
        out, c = self._head_forward(h, s)
        grads = {k: np.zeros_like(v) for k, v in P.items()}

        if self.head == "node_binary":
            assert s.y_node is not None
            mask = s.y_node >= 0
            n_lab = max(1, int(mask.sum()))
            prob = _sigmoid(out).ravel()
            y = np.where(mask, s.y_node, 0).astype(float)
            # pos_weight rebalances the rare bottleneck class (most
            # historical deployments are over-provisioned → label 0).
            w = np.where(y > 0, self.pos_weight, 1.0) * mask
            w = w / max(w.sum(), 1e-9)
            eps = 1e-9
            loss = float(
                -(w * (y * np.log(prob + eps) + (1 - y) * np.log(1 - prob + eps))).sum()
            )
            dout = (w * (prob - y)).reshape(-1, 1)
        else:
            assert s.y_graph is not None
            pred = float(out.ravel()[0])
            loss = 0.5 * (pred - s.y_graph) ** 2
            dout = np.array([[pred - s.y_graph]])

        # head backward
        u, pre1, zp, z = c["u"], c["pre1"], c["zp"], c["z"]
        grads["W2"] += u.T @ dout
        grads["b2"] += dout.sum(axis=0)
        du = dout @ P["W2"].T
        dpre1 = du * (pre1 > 0)
        grads["W1"] += zp.T @ dpre1
        grads["b1"] += dpre1.sum(axis=0)
        dzp = dpre1 @ P["W1"].T
        if self.head == "graph_reg":
            dz = np.repeat(dzp, c["pool_n"], axis=0) / c["pool_n"]
        else:
            dz = dzp
        if self.use_fuse:
            dpreF = dz * (c["preF"] > 0)
            grads["Wf"] += c["cat"].T @ dpreF
            grads["bf"] += dpreF.sum(axis=0)
            dcat = dpreF @ P["Wf"].T
            dh = dcat[:, : self.dim]
        else:
            dh = dz

        # message-passing backward
        for entry in reversed(enc_cache):
            if entry[0] == "mp":
                _, t, h_prev, msg_i, msg_o, pre = entry
                dpre = dh * (pre > 0)
                grads[f"Ws{t}"] += h_prev.T @ dpre
                grads[f"Wi{t}"] += msg_i.T @ dpre
                grads[f"Wo{t}"] += msg_o.T @ dpre
                grads[f"b{t}_mp"] += dpre.sum(axis=0)
                dh = (
                    dpre @ P[f"Ws{t}"].T
                    + s.a_in.T @ (dpre @ P[f"Wi{t}"].T)
                    + s.a_out.T @ (dpre @ P[f"Wo{t}"].T)
                )
            else:
                _, x, pre0 = entry
                dpre0 = dh * (pre0 > 0)
                grads["W0"] += x.T @ dpre0
                grads["b0"] += dpre0.sum(axis=0)
        return loss, grads

    # -- optimisation ------------------------------------------------------
    def _adam_step(self, grads: dict[str, np.ndarray], lr: float) -> None:
        self._adam_t += 1
        b1, b2, eps = 0.9, 0.999, 1e-8
        for k, g in grads.items():
            self._adam_m[k] = b1 * self._adam_m[k] + (1 - b1) * g
            self._adam_v[k] = b2 * self._adam_v[k] + (1 - b2) * g * g
            mhat = self._adam_m[k] / (1 - b1**self._adam_t)
            vhat = self._adam_v[k] / (1 - b2**self._adam_t)
            self.params[k] -= lr * mhat / (np.sqrt(vhat) + eps)

    def fit(
        self,
        samples: list[GraphSample],
        *,
        epochs: int = 60,
        lr: float = 3e-3,
        batch_size: int = 16,
        seed: int = 0,
        verbose: bool = False,
    ) -> list[float]:
        """Mini-batch Adam; gradients averaged over the batch's graphs.
        Returns per-epoch mean loss."""
        rng = np.random.default_rng(seed)
        if self.head == "node_binary":
            n_pos = sum(int((s.y_node == 1).sum()) for s in samples)
            n_neg = sum(int((s.y_node == 0).sum()) for s in samples)
            self.pos_weight = max(1.0, n_neg / max(1, n_pos))
        history: list[float] = []
        idx = np.arange(len(samples))
        for ep in range(epochs):
            rng.shuffle(idx)
            losses: list[float] = []
            for start in range(0, len(idx), batch_size):
                chunk = idx[start : start + batch_size]
                agg: dict[str, np.ndarray] | None = None
                for i in chunk:
                    loss, grads = self.loss_grads(samples[i])
                    losses.append(loss)
                    if agg is None:
                        agg = grads
                    else:
                        for k in agg:
                            agg[k] += grads[k]
                assert agg is not None
                for k in agg:
                    agg[k] /= len(chunk)
                self._adam_step(agg, lr)
            history.append(float(np.mean(losses)))
            if verbose and ep % 10 == 0:
                print(f"epoch {ep}: loss {history[-1]:.4f}")
        return history

    def accuracy(self, samples: list[GraphSample]) -> float:
        """Labelled-node classification accuracy (node_binary head)."""
        hit = tot = 0
        for s in samples:
            prob = self.predict_proba(s)
            mask = s.y_node >= 0
            hit += int(((prob > 0.5).astype(int) == s.y_node)[mask].sum())
            tot += int(mask.sum())
        return hit / max(1, tot)
