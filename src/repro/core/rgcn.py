"""Relational Graph Convolutional Network in pure numpy.

Implements the paper's encoder (Eq. 5) with basis decomposition
(Eq. 6): per layer l and relation r,

    H^{l+1} = act( Σ_r Â_r H^l W_r^l + H^l W_0^l ),
    W_r^l   = Σ_b a_rb^l V_b^l,

where Â_r is row-normalized by c_vw = |N_r(v)|. The final layer emits
class logits per node with softmax + cross-entropy (binary phrase
membership uses 2 classes, key-element recognition uses 4).

The paper trains with PyTorch; QTIGs are tiny (tens of nodes), so a
hand-rolled forward/backward with Adam trains hundreds of graphs per
second on the driver — the weights are then broadcast and inference
runs distributed (see ``repro.core.gctsp``). Manual gradients are
verified against finite differences in tests.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class Graph:
    """Preprocessed model input: features + per-relation adjacency."""

    x: np.ndarray          # (n, d_in) node features
    adj: list[np.ndarray]  # R matrices, each (n, n), row-normalized

    @property
    def n(self) -> int:
        return self.x.shape[0]


def build_graph(
    x: np.ndarray, edges: list[tuple[int, int, int]], n_relations: int
) -> Graph:
    """Row-normalized per-relation adjacency from typed edge list.

    Â_r[v, w] = 1/|N_r(v)| for each edge (v, w, r): messages flow from w
    into v, matching Eq. 5's sum over w ∈ N_r(v).
    """
    n = x.shape[0]
    adj = [np.zeros((n, n)) for _ in range(n_relations)]
    for v, w, r in edges:
        adj[r][v, w] = 1.0
    for a in adj:
        deg = a.sum(axis=1, keepdims=True)
        np.divide(a, deg, out=a, where=deg > 0)
    return Graph(x=np.asarray(x, dtype=np.float64), adj=adj)


def _relu(z: np.ndarray) -> np.ndarray:
    return np.maximum(z, 0.0)


def _softmax(z: np.ndarray) -> np.ndarray:
    z = z - z.max(axis=-1, keepdims=True)
    e = np.exp(z)
    return e / e.sum(axis=-1, keepdims=True)


class RGCN:
    """Multi-layer R-GCN with basis decomposition and Adam training."""

    def __init__(
        self,
        d_in: int,
        n_relations: int,
        n_classes: int,
        *,
        d_hidden: int = 32,
        n_layers: int = 5,
        n_bases: int = 5,
        seed: int = 0,
    ) -> None:
        self.d_in = d_in
        self.R = n_relations
        self.B = n_bases
        self.n_layers = n_layers
        self.dims = [d_in] + [d_hidden] * (n_layers - 1) + [n_classes]
        rng = np.random.default_rng(seed)
        self.params: dict[str, np.ndarray] = {}
        for l in range(n_layers):
            di, do = self.dims[l], self.dims[l + 1]
            scale = np.sqrt(2.0 / (di + do))
            self.params[f"V{l}"] = rng.normal(0, scale, (self.B, di, do))
            self.params[f"a{l}"] = rng.normal(0, 1.0 / np.sqrt(self.B), (self.R, self.B))
            self.params[f"W0_{l}"] = rng.normal(0, scale, (di, do))
        self._adam_m = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._adam_v = {k: np.zeros_like(v) for k, v in self.params.items()}
        self._adam_t = 0

    # ------------------------------------------------------------------ fwd
    def forward(self, g: Graph) -> tuple[np.ndarray, dict]:
        """Per-node class probabilities (n, n_classes) + backprop cache."""
        h = g.x
        cache: dict = {"h": [h], "ah": [], "w": []}
        for l in range(self.n_layers):
            w_r = np.einsum("rb,bio->rio", self.params[f"a{l}"], self.params[f"V{l}"])
            ah = np.stack([a @ h for a in g.adj])          # (R, n, di)
            z = np.einsum("rni,rio->no", ah, w_r) + h @ self.params[f"W0_{l}"]
            cache["ah"].append(ah)
            cache["w"].append(w_r)
            h = _relu(z) if l < self.n_layers - 1 else z
            cache["h"].append(h)
        probs = _softmax(h)
        cache["probs"] = probs
        return probs, cache

    # ------------------------------------------------------------------ bwd
    def backward(
        self, g: Graph, cache: dict, labels: np.ndarray, weights: np.ndarray | None = None
    ) -> tuple[float, dict[str, np.ndarray]]:
        """Cross-entropy loss + gradients for one graph.

        ``labels``: (n,) int class ids. ``weights``: optional per-node
        loss weights (e.g. to upweight rare positive nodes).
        """
        probs = cache["probs"]
        n = probs.shape[0]
        w = np.ones(n) if weights is None else weights
        w = w / w.sum() * n  # keep average weight 1 so lr is comparable
        eps = 1e-12
        loss = float(-(w * np.log(probs[np.arange(n), labels] + eps)).sum() / n)

        dz = probs.copy()
        dz[np.arange(n), labels] -= 1.0
        dz *= (w / n)[:, None]

        grads: dict[str, np.ndarray] = {}
        for l in range(self.n_layers - 1, -1, -1):
            h_prev = cache["h"][l]
            ah = cache["ah"][l]
            w_r = cache["w"][l]
            if l < self.n_layers - 1:
                dz = dz * (cache["h"][l + 1] > 0)  # relu mask
            # dW_r (raw, per relation): (A_r h_prev)^T dz
            m_r = np.einsum("rni,no->rio", ah, dz)
            grads[f"V{l}"] = np.einsum("rb,rio->bio", self.params[f"a{l}"], m_r)
            grads[f"a{l}"] = np.einsum("bio,rio->rb", self.params[f"V{l}"], m_r)
            grads[f"W0_{l}"] = h_prev.T @ dz
            if l > 0:
                dh = dz @ self.params[f"W0_{l}"].T
                dzw = np.einsum("no,rio->rni", dz, w_r)
                for r, a in enumerate(g.adj):
                    dh += a.T @ dzw[r]
                dz = dh
        return loss, grads

    # ----------------------------------------------------------------- step
    def adam_step(self, grads: dict[str, np.ndarray], lr: float = 5e-3) -> None:
        self._adam_t += 1
        b1, b2, eps = 0.9, 0.999, 1e-8
        for k, p in self.params.items():
            gk = grads[k]
            self._adam_m[k] = b1 * self._adam_m[k] + (1 - b1) * gk
            self._adam_v[k] = b2 * self._adam_v[k] + (1 - b2) * gk * gk
            mhat = self._adam_m[k] / (1 - b1**self._adam_t)
            vhat = self._adam_v[k] / (1 - b2**self._adam_t)
            p -= lr * mhat / (np.sqrt(vhat) + eps)

    def fit(
        self,
        graphs: list[Graph],
        labels: list[np.ndarray],
        *,
        epochs: int = 8,
        lr: float = 5e-3,
        positive_weight: float = 1.0,
        seed: int = 0,
        verbose: bool = False,
    ) -> list[float]:
        """Per-graph SGD with Adam; returns mean loss per epoch."""
        rng = np.random.default_rng(seed)
        history = []
        idx = np.arange(len(graphs))
        for ep in range(epochs):
            rng.shuffle(idx)
            total = 0.0
            for i in idx:
                probs, cache = self.forward(graphs[i])
                y = labels[i]
                w = np.where(y > 0, positive_weight, 1.0).astype(np.float64)
                loss, grads = self.backward(graphs[i], cache, y, w)
                self.adam_step(grads, lr)
                total += loss
            history.append(total / max(1, len(graphs)))
            if verbose:
                print(f"[rgcn] epoch {ep}: loss {history[-1]:.4f}")
        return history

    def predict(self, g: Graph) -> np.ndarray:
        """Per-node class probabilities, no cache."""
        return self.forward(g)[0]

    # ------------------------------------------------------------ serialize
    def state(self) -> dict:
        """Picklable weights (for Spark broadcast)."""
        return {
            "dims": self.dims,
            "R": self.R,
            "B": self.B,
            "n_layers": self.n_layers,
            "params": {k: v.copy() for k, v in self.params.items()},
        }

    @classmethod
    def from_state(cls, st: dict) -> "RGCN":
        m = cls.__new__(cls)
        m.dims = st["dims"]
        m.d_in = st["dims"][0]
        m.R = st["R"]
        m.B = st["B"]
        m.n_layers = st["n_layers"]
        m.params = {k: np.asarray(v) for k, v in st["params"].items()}
        m._adam_m = {k: np.zeros_like(v) for k, v in m.params.items()}
        m._adam_v = {k: np.zeros_like(v) for k, v in m.params.items()}
        m._adam_t = 0
        return m
