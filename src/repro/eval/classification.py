"""Node-classification evaluation (paper §V-B protocol).

Multi-class (planted-community) node classification over learned
embeddings with one-vs-rest logistic regression, reporting Micro-F1
and Macro-F1. Implemented in numpy (no sklearn in the container); at
embedding dimension ≤ 128 and ≤ 10^5 nodes full-batch gradient descent
is exact enough and fast.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -35, 35)))


def train_logreg_ovr(
    X: np.ndarray,
    y: np.ndarray,
    n_classes: int,
    *,
    lr: float = 0.5,
    iters: int = 300,
    l2: float = 1e-4,
) -> np.ndarray:
    """One-vs-rest logistic regression; returns ``W[(d+1), C]``."""
    n, d = X.shape
    Xb = np.concatenate([X, np.ones((n, 1))], axis=1)
    Y = np.zeros((n, n_classes))
    Y[np.arange(n), y] = 1.0
    W = np.zeros((d + 1, n_classes))
    for _ in range(iters):
        P = _sigmoid(Xb @ W)
        gradW = Xb.T @ (P - Y) / n + l2 * W
        W -= lr * gradW
    return W


def predict(X: np.ndarray, W: np.ndarray) -> np.ndarray:
    Xb = np.concatenate([X, np.ones((X.shape[0], 1))], axis=1)
    return np.argmax(Xb @ W, axis=1)


def f1_scores(y_true: np.ndarray, y_pred: np.ndarray, n_classes: int):
    """(micro_f1, macro_f1) for single-label multi-class prediction."""
    micro_tp = fp = fn = 0
    per_class = []
    for c in range(n_classes):
        tp = int(np.sum((y_pred == c) & (y_true == c)))
        fpc = int(np.sum((y_pred == c) & (y_true != c)))
        fnc = int(np.sum((y_pred != c) & (y_true == c)))
        micro_tp += tp
        fp += fpc
        fn += fnc
        denom = 2 * tp + fpc + fnc
        per_class.append(2 * tp / denom if denom else 0.0)
    micro = 2 * micro_tp / (2 * micro_tp + fp + fn) if (micro_tp + fp + fn) else 0.0
    return float(micro), float(np.mean(per_class))


@dataclass
class EvalResult:
    micro_f1: float
    macro_f1: float


def evaluate_embeddings(
    emb: np.ndarray,
    labels: np.ndarray,
    *,
    train_frac: float = 0.5,
    seed: int = 0,
) -> EvalResult:
    """Paper §V-B protocol: train on a fraction of labeled nodes,
    report Micro/Macro-F1 on the rest."""
    rng = np.random.default_rng(seed)
    n = emb.shape[0]
    n_classes = int(labels.max()) + 1
    # Normalize features for stable full-batch GD.
    mu, sd = emb.mean(0), emb.std(0) + 1e-9
    X = (emb - mu) / sd
    perm = rng.permutation(n)
    cut = int(train_frac * n)
    tr, te = perm[:cut], perm[cut:]
    W = train_logreg_ovr(X[tr], labels[tr], n_classes)
    pred = predict(X[te], W)
    micro, macro = f1_scores(labels[te], pred, n_classes)
    return EvalResult(micro_f1=micro, macro_f1=macro)
