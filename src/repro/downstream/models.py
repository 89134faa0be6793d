"""Numpy downstream models: MLP, gradient-boosted stumps, naive Bayes.

The paper evaluates MLP and XGBoost. scikit-learn/xgboost are not
installed in this container, so:

  * ``MLP`` is the identical model class (one hidden layer, Adam).
  * ``GBTStumps`` substitutes XGBoost with gradient-boosted depth-1
    regression trees (squared loss; multiclass via one-hot LS boosting
    with argmax decode) — the same tree-ensemble inductive bias on
    tabular data.
  * ``NaiveBayes`` is the fast weak learner BoostClean's selection loop
    trains hundreds of times.
"""
from __future__ import annotations

import numpy as np


class MLP:
    """One-hidden-layer perceptron with Adam, for both tasks."""

    def __init__(
        self,
        task: str = "classification",
        hidden: int = 64,
        epochs: int = 60,
        lr: float = 1e-2,
        seed: int = 0,
    ):
        if task not in ("classification", "regression"):
            raise ValueError(f"unknown task {task!r}")
        self.task = task
        self.hidden = hidden
        self.epochs = epochs
        self.lr = lr
        self.seed = seed

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MLP":
        rng = np.random.default_rng(self.seed)
        n, d = X.shape
        k = int(y.max()) + 1 if self.task == "classification" else 1
        k = max(k, 1)
        self.W1 = rng.standard_normal((d, self.hidden)) / np.sqrt(max(d, 1))
        self.b1 = np.zeros(self.hidden)
        self.W2 = rng.standard_normal((self.hidden, k)) / np.sqrt(self.hidden)
        self.b2 = np.zeros(k)
        params = [self.W1, self.b1, self.W2, self.b2]
        m = [np.zeros_like(p) for p in params]
        v = [np.zeros_like(p) for p in params]
        if self.task == "classification":
            Y = np.zeros((n, k))
            valid = y >= 0
            Y[np.arange(n)[valid], y[valid]] = 1.0
        else:
            Y = y.reshape(-1, 1).astype(float)
        t = 0
        for _ in range(self.epochs):
            t += 1
            H = np.maximum(X @ self.W1 + self.b1, 0.0)
            O = H @ self.W2 + self.b2
            if self.task == "classification":
                O -= O.max(axis=1, keepdims=True)
                P = np.exp(O)
                P /= P.sum(axis=1, keepdims=True)
                dO = (P - Y) / n
            else:
                dO = 2.0 * (O - Y) / n
            dW2 = H.T @ dO
            db2 = dO.sum(0)
            dH = dO @ self.W2.T
            dH[H <= 0] = 0.0
            dW1 = X.T @ dH
            db1 = dH.sum(0)
            grads = [dW1, db1, dW2, db2]
            for i, (p, g) in enumerate(zip(params, grads)):
                m[i] = 0.9 * m[i] + 0.1 * g
                v[i] = 0.999 * v[i] + 0.001 * g * g
                mh = m[i] / (1 - 0.9**t)
                vh = v[i] / (1 - 0.999**t)
                p -= self.lr * mh / (np.sqrt(vh) + 1e-8)
        return self

    def _forward(self, X: np.ndarray) -> np.ndarray:
        H = np.maximum(X @ self.W1 + self.b1, 0.0)
        return H @ self.W2 + self.b2

    def predict(self, X: np.ndarray) -> np.ndarray:
        O = self._forward(X)
        if self.task == "classification":
            return O.argmax(axis=1)
        return O.ravel()


class GBTStumps:
    """Gradient-boosted depth-1 trees (XGBoost substitute)."""

    def __init__(
        self,
        task: str = "classification",
        rounds: int = 80,
        lr: float = 0.2,
        seed: int = 0,
    ):
        self.task = task
        self.rounds = rounds
        self.lr = lr
        self.seed = seed

    def _fit_one(self, X: np.ndarray, r: np.ndarray) -> list[tuple]:
        """One boosting pass on residuals ``r`` -> list of stumps per
        round is kept flat in self.stumps by the caller."""
        best = None
        rng = self._rng
        d = X.shape[1]
        cols = rng.choice(d, size=min(d, 24), replace=False)
        for j in cols:
            x = X[:, j]
            thr = np.median(x)
            left = x <= thr
            nl, nr = left.sum(), (~left).sum()
            if nl == 0 or nr == 0:
                continue
            vl, vr = r[left].mean(), r[~left].mean()
            gain = nl * vl * vl + nr * vr * vr
            if best is None or gain > best[0]:
                best = (gain, j, thr, vl, vr)
        return best

    def fit(self, X: np.ndarray, y: np.ndarray) -> "GBTStumps":
        self._rng = np.random.default_rng(self.seed)
        if self.task == "classification":
            k = int(y.max()) + 1
            k = max(k, 1)
            Y = np.zeros((len(y), k))
            valid = y >= 0
            Y[np.arange(len(y))[valid], y[valid]] = 1.0
        else:
            k = 1
            Y = y.reshape(-1, 1).astype(float)
        self.k = k
        self.base = Y.mean(axis=0)
        pred = np.tile(self.base, (len(y), 1))
        self.stumps: list[list[tuple]] = []
        for _ in range(self.rounds):
            layer = []
            for c in range(k):
                r = Y[:, c] - pred[:, c]
                s = self._fit_one(X, r)
                if s is not None:
                    _, j, thr, vl, vr = s
                    upd = np.where(X[:, j] <= thr, vl, vr)
                    pred[:, c] += self.lr * upd
                    layer.append((c, j, thr, vl, vr))
            self.stumps.append(layer)
        return self

    def _score(self, X: np.ndarray) -> np.ndarray:
        pred = np.tile(self.base, (len(X), 1))
        for layer in self.stumps:
            for c, j, thr, vl, vr in layer:
                pred[:, c] += self.lr * np.where(X[:, j] <= thr, vl, vr)
        return pred

    def predict(self, X: np.ndarray) -> np.ndarray:
        s = self._score(X)
        if self.task == "classification":
            return s.argmax(axis=1)
        return s.ravel()


class NaiveBayes:
    """Bernoulli naive Bayes over the 0/1 one-hot blocks — the cheap
    validation model inside BoostClean's repair-selection loop."""

    def __init__(self, alpha: float = 1.0):
        self.alpha = alpha

    def fit(self, X: np.ndarray, y: np.ndarray) -> "NaiveBayes":
        Xb = (X > 0.5).astype(float)
        classes = np.unique(y[y >= 0])
        if len(classes) == 0:
            classes = np.array([0])
        self.classes = classes
        self.logp_c = np.zeros(len(classes))
        self.logp_f = np.zeros((len(classes), X.shape[1]))
        self.logq_f = np.zeros((len(classes), X.shape[1]))
        for i, c in enumerate(classes):
            sub = Xb[y == c]
            n = max(len(sub), 1)
            self.logp_c[i] = np.log((len(sub) + 1) / (len(y) + len(classes)))
            p = (sub.sum(0) + self.alpha) / (n + 2 * self.alpha)
            self.logp_f[i] = np.log(p)
            self.logq_f[i] = np.log(1 - p)
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        Xb = (X > 0.5).astype(float)
        scores = (
            self.logp_c[None, :]
            + Xb @ self.logp_f.T
            + (1 - Xb) @ self.logq_f.T
        )
        return self.classes[scores.argmax(axis=1)]
