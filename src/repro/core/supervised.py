"""Supervised matching: fine-tuned embeddings + a trained classification head.

The paper fine-tunes each dynamic model inside EMTransformer and trains
DeepMatcher over the static models. Our substitute (DESIGN.md §2):

* dynamic models use ``ModelSpec.finetuned()`` — training aligns the final
  layers with the matching signal, so the untrained-mixing collapses;
* the classification head is a small numpy MLP over the standard pair
  features ``[|v_l − v_r| , v_l ⊙ v_r]`` trained with Adam + binary
  cross-entropy. Epoch selection follows the paper's corrected protocol:
  the epoch maximizing *validation* F1 is applied to the test set (the
  original EMTransformer overfits by selecting on test).

Timing mirrors Table 6's *shape*: training time is dominated by encoding the
train+validation pairs, so it scales with the surrogate encoder (XLNet's 3
attention layers slowest, S-MiniLM's 384-d single layer fastest), plus the
head's epochs; testing time = encoding + scoring the test pairs. Unlike real
fine-tuning we encode once rather than once per epoch, so absolute times are
proportionally smaller (documented in EXPERIMENTS.md).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.metrics import prf
from repro.core.models import MODELS, ModelSpec, embed_batch
from repro.data import dsm


def pair_features(vl: np.ndarray, vr: np.ndarray) -> np.ndarray:
    """EMTransformer-style pair representation: [|Δ|, element-product]."""
    return np.concatenate([np.abs(vl - vr), vl * vr], axis=1).astype(np.float32)


class MLPClassifier:
    """Two-layer MLP head (in → 64 → 1), Adam, BCE; deterministic in seed."""

    def __init__(self, d_in: int, hidden: int = 64, seed: int = 0,
                 lr: float = 1e-2):
        g = np.random.default_rng(seed)
        self.W1 = (g.standard_normal((d_in, hidden)) / np.sqrt(d_in)).astype(np.float32)
        self.b1 = np.zeros(hidden, dtype=np.float32)
        self.W2 = (g.standard_normal((hidden, 1)) / np.sqrt(hidden)).astype(np.float32)
        self.b2 = np.zeros(1, dtype=np.float32)
        self.lr = lr
        self._adam = {k: [np.zeros_like(v), np.zeros_like(v)]
                      for k, v in self._params().items()}
        self._t = 0

    def _params(self):
        return {"W1": self.W1, "b1": self.b1, "W2": self.W2, "b2": self.b2}

    def _forward(self, X):
        h = np.maximum(X @ self.W1 + self.b1, 0.0)
        z = np.clip((h @ self.W2 + self.b2).ravel(), -30.0, 30.0)
        return h, 1.0 / (1.0 + np.exp(-z))

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        return self._forward(X)[1]

    def train_epoch(self, X: np.ndarray, y: np.ndarray, *, batch: int = 128,
                    rng: np.random.Generator) -> float:
        order = rng.permutation(len(X))
        total = 0.0
        for s in range(0, len(X), batch):
            idx = order[s: s + batch]
            xb, yb = X[idx], y[idx]
            h, p = self._forward(xb)
            eps = 1e-7
            total += float(-np.mean(yb * np.log(p + eps)
                                    + (1 - yb) * np.log(1 - p + eps))) * len(xb)
            dz = (p - yb)[:, None] / len(xb)
            gW2 = h.T @ dz
            gb2 = dz.sum(0)
            dh = dz @ self.W2.T * (h > 0)
            gW1 = xb.T @ dh
            gb1 = dh.sum(0)
            self._t += 1
            for k, gmat in (("W1", gW1), ("b1", gb1), ("W2", gW2), ("b2", gb2)):
                m, v = self._adam[k]
                m[:] = 0.9 * m + 0.1 * gmat.reshape(m.shape)
                v[:] = 0.999 * v + 0.001 * (gmat.reshape(v.shape) ** 2)
                mhat = m / (1 - 0.9 ** self._t)
                vhat = v / (1 - 0.999 ** self._t)
                self._params()[k] -= self.lr * mhat / (np.sqrt(vhat) + 1e-8)
        return total / len(X)


def _f1_at_half(p: np.ndarray, y: np.ndarray) -> float:
    pred = p >= 0.5
    return prf(int(pred.sum()), int(y.sum()), int((pred & (y == 1)).sum()))[2]


@dataclass
class SupervisedResult:
    model: str
    dataset: str
    f1: float
    t_train: float
    t_test: float
    best_epoch: int


def train_eval(dataset: str, model_code: str, *, epochs: int = 10,
               seed: int = 0, data: pd.DataFrame | None = None,
               sample: float = 1.0) -> SupervisedResult:
    """Fine-tune ``model_code`` on DSM ``dataset`` and evaluate on test.

    Static models use their frozen embeddings (DeepMatcher-style); dynamic
    models use the fine-tuned spec, whose encoder dominates the measured
    training time (Table 6's shape).
    """
    spec: ModelSpec = MODELS[model_code].finetuned()
    df = data if data is not None else dsm.generate_pandas(dataset)
    if sample < 1.0:  # stratified subsample for benchmark-scale runs
        df = (df.groupby(["split", "label"], group_keys=False)
              .sample(frac=sample, random_state=seed)
              .reset_index(drop=True))
    left = dsm.sentences(df, "left").tolist()
    right = dsm.sentences(df, "right").tolist()
    y = df["label"].to_numpy(dtype=np.float32)
    tr = (df["split"] == "train").to_numpy()
    va = (df["split"] == "valid").to_numpy()
    te = (df["split"] == "test").to_numpy()

    def embed_chunked(texts: list[str], chunk: int = 512) -> np.ndarray:
        # chunking bounds the padded (B, L, d) attention tensor
        return np.concatenate([
            embed_batch(spec, texts[s: s + chunk])
            for s in range(0, len(texts), chunk)])

    def embed_pairs(mask) -> np.ndarray:
        vl = embed_chunked([s for s, m in zip(left, mask) if m])
        vr = embed_chunked([s for s, m in zip(right, mask) if m])
        return pair_features(vl, vr)

    rng = np.random.default_rng(seed)
    t0 = time.perf_counter()
    Xtr = embed_pairs(tr)
    Xva = embed_pairs(va)
    # standardize on train statistics — raw pair features are ~1e-2 scale
    mu = Xtr.mean(axis=0)
    sd = Xtr.std(axis=0) + 1e-6
    Xtr = (Xtr - mu) / sd
    Xva = (Xva - mu) / sd
    clf = MLPClassifier(Xtr.shape[1], seed=seed)
    ytr, yva = y[tr], y[va]
    best = (-1.0, 0, None)
    for ep in range(1, epochs + 1):
        clf.train_epoch(Xtr, ytr, rng=rng)
        f1v = _f1_at_half(clf.predict_proba(Xva), yva)
        if f1v > best[0]:
            best = (f1v, ep, {k: v.copy() for k, v in clf._params().items()})
    t_train = time.perf_counter() - t0

    if best[2] is not None:  # restore the best-on-validation weights
        for k, v in best[2].items():
            clf._params()[k][:] = v

    t0 = time.perf_counter()
    Xte = (embed_pairs(te) - mu) / sd
    f1t = _f1_at_half(clf.predict_proba(Xte), y[te])
    t_test = time.perf_counter() - t0
    return SupervisedResult(model=model_code, dataset=dataset, f1=f1t,
                            t_train=t_train, t_test=t_test, best_epoch=best[1])
