"""Shared baseline machinery: vector featurizer kernels + numpy MLP.

Every baseline reduces a candidate pair to a fixed-length feature
vector via a per-partition ``mapInPandas`` kernel (same distributed
shape as the AdaMEL featurizer) and trains a small numpy MLP (or
logistic regression = MLP with no hidden layer) with Adam + BCE.
"""
from __future__ import annotations

from collections.abc import Callable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from ..text.embed import HashEmbedding
from ..text.tokenize import tokenize

RowFn = Callable[[list[list[str]], list[list[str]], HashEmbedding], np.ndarray]


def vector_features(
    pairs_wide: DataFrame, attrs: list[str], row_fn: RowFn, *, dim: int = 32
) -> DataFrame:
    """(pair_id, label, v) where v = row_fn(tokens_a, tokens_b, emb).

    ``row_fn`` receives the per-attribute token lists of both records
    (already tokenized + cropped) and a partition-local embedding table.
    """
    a_cols = [f"a_{a}" for a in attrs]
    b_cols = [f"b_{a}" for a in attrs]
    cols = ["pair_id", "label", *a_cols, *b_cols]

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        emb = HashEmbedding(dim)
        for pdf in batches:
            vs = []
            for row in pdf.to_dict("records"):
                ta = [tokenize(row[c]) for c in a_cols]
                tb = [tokenize(row[c]) for c in b_cols]
                vs.append(row_fn(ta, tb, emb).astype(float).tolist())
            yield pd.DataFrame(
                {
                    "pair_id": pdf["pair_id"].values,
                    "label": pdf["label"].astype("float64").values,
                    "v": vs,
                }
            )

    return pairs_wide.select(*cols).mapInPandas(
        kernel, schema="pair_id string, label double, v array<double>"
    )


def collect_vectors(fdf: DataFrame) -> tuple[list[str], np.ndarray, np.ndarray]:
    """Collect a vector-feature DataFrame to (ids, y, X)."""
    pdf = fdf.toPandas()
    ids = pdf["pair_id"].tolist()
    y = pdf["label"].to_numpy(dtype=float)
    X = (
        np.stack([np.asarray(v, dtype=float) for v in pdf["v"]])
        if len(pdf)
        else np.zeros((0, 0))
    )
    return ids, y, X


class NumpyMLP:
    """Feed-forward binary classifier: relu hidden layers, sigmoid out.

    ``hidden=[]`` degenerates to logistic regression (TLER). Inputs are
    standardized with train-set statistics inside ``fit``.
    """

    def __init__(self, n_in: int, hidden: list[int] = (32,), seed: int = 0,
                 lr: float = 3e-3, epochs: int = 60, batch_size: int = 32):
        g = np.random.default_rng(seed)
        dims = [n_in, *hidden, 1]
        self.Ws = [g.standard_normal((dims[i + 1], dims[i])) * np.sqrt(2.0 / dims[i])
                   for i in range(len(dims) - 1)]
        self.bs = [np.zeros(dims[i + 1]) for i in range(len(dims) - 1)]
        self.lr, self.epochs, self.batch_size = lr, epochs, batch_size
        self.seed = seed
        self.mu = np.zeros(n_in)
        self.sd = np.ones(n_in)

    def _forward(self, X: np.ndarray):
        acts = [X]
        for i, (W, b) in enumerate(zip(self.Ws, self.bs)):
            z = acts[-1] @ W.T + b
            acts.append(np.maximum(z, 0) if i < len(self.Ws) - 1 else z)
        logit = acts[-1].ravel()
        return acts, 1.0 / (1.0 + np.exp(-logit))

    def fit(self, X: np.ndarray, y: np.ndarray) -> "NumpyMLP":
        self.mu = X.mean(axis=0)
        self.sd = np.where(X.std(axis=0) > 1e-8, X.std(axis=0), 1.0)
        Xs = (X - self.mu) / self.sd
        rng = np.random.default_rng(self.seed)
        m = [np.zeros_like(W) for W in self.Ws] + [np.zeros_like(b) for b in self.bs]
        v = [np.zeros_like(a) for a in m]
        t = 0
        for _ in range(self.epochs):
            order = rng.permutation(len(Xs))
            for s in range(0, len(order), self.batch_size):
                idx = order[s : s + self.batch_size]
                acts, yhat = self._forward(Xs[idx])
                dlogit = (yhat - y[idx]) / len(idx)
                grads_W, grads_b = [], []
                delta = dlogit[:, None]
                for i in range(len(self.Ws) - 1, -1, -1):
                    grads_W.insert(0, delta.T @ acts[i])
                    grads_b.insert(0, delta.sum(axis=0))
                    if i > 0:
                        delta = (delta @ self.Ws[i]) * (acts[i] > 0)
                t += 1
                flat = grads_W + grads_b
                tgt = self.Ws + self.bs
                for j, (p, g_) in enumerate(zip(tgt, flat)):
                    m[j] = 0.9 * m[j] + 0.1 * g_
                    v[j] = 0.999 * v[j] + 0.001 * g_ * g_
                    mh = m[j] / (1 - 0.9**t)
                    vh = v[j] / (1 - 0.999**t)
                    p -= self.lr * mh / (np.sqrt(vh) + 1e-8)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        _, yhat = self._forward((X - self.mu) / self.sd)
        return yhat


# ------------------------------------------------------- shared features

def sim_stats(ta: list[str], tb: list[str]) -> list[float]:
    """Classic per-attribute string-similarity statistics (TLER space)."""
    sa, sb = set(ta), set(tb)
    inter, union = len(sa & sb), len(sa | sb)
    jac = inter / union if union else 0.0
    cont = inter / min(len(sa), len(sb)) if sa and sb else 0.0
    lenr = min(len(sa), len(sb)) / max(len(sa), len(sb)) if sa and sb else 0.0
    exact = 1.0 if ta and ta == tb else 0.0
    both_missing = 1.0 if not sa and not sb else 0.0
    one_missing = 1.0 if (bool(sa) != bool(sb)) else 0.0
    return [jac, cont, lenr, exact, both_missing, one_missing]
