"""Unit tests for the numpy downstream models (MLP / GBT stumps / NB)."""
import numpy as np
import pandas as pd
import pytest

from repro.downstream.encode import Encoder
from repro.downstream.models import GBTStumps, MLP, NaiveBayes


def _separable_classification(n=400, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.standard_normal((n, 6))
    y = (X[:, 0] + 0.5 * X[:, 1] > 0).astype(int)
    return X, y


def _linear_regression_data(n=400, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.standard_normal((n, 4))
    y = 2.0 * X[:, 0] - X[:, 2] + 0.05 * rng.standard_normal(n)
    return X, y


@pytest.mark.parametrize("model_cls", [MLP, GBTStumps])
def test_classifier_learns_separable_data(model_cls):
    X, y = _separable_classification()
    m = model_cls(task="classification", seed=1).fit(X[:300], y[:300])
    acc = (m.predict(X[300:]) == y[300:]).mean()
    assert acc > 0.85


@pytest.mark.parametrize("model_cls", [MLP, GBTStumps])
def test_regressor_beats_mean_baseline(model_cls):
    X, y = _linear_regression_data()
    m = model_cls(task="regression", seed=1).fit(X[:300], y[:300])
    pred = m.predict(X[300:])
    mse = np.mean((pred - y[300:]) ** 2)
    base = np.mean((y[300:] - y[:300].mean()) ** 2)
    assert mse < 0.5 * base


def test_mlp_multiclass():
    rng = np.random.default_rng(3)
    X = rng.standard_normal((600, 4))
    y = (X[:, 0] > 0).astype(int) + 2 * (X[:, 1] > 0).astype(int)
    m = MLP(task="classification", seed=2, epochs=120).fit(X[:500], y[:500])
    acc = (m.predict(X[500:]) == y[500:]).mean()
    assert acc > 0.8


def test_mlp_rejects_unknown_task():
    with pytest.raises(ValueError):
        MLP(task="clustering")


def test_naive_bayes_on_onehot():
    rng = np.random.default_rng(5)
    y = rng.integers(0, 2, 500)
    X = np.zeros((500, 4))
    X[np.arange(500), y] = 1.0  # feature j fires exactly for class j
    m = NaiveBayes().fit(X[:400], y[:400])
    assert (m.predict(X[400:]) == y[400:]).mean() == 1.0


def test_naive_bayes_ignores_negative_labels():
    X = np.eye(4)
    y = np.array([0, 1, -1, -1])
    m = NaiveBayes().fit(X, y)
    assert set(m.predict(X)) <= {0, 1}


def test_encoder_shapes_and_determinism():
    pdf = pd.DataFrame(
        {
            "a": ["x", "y", "x", None],
            "b": ["1", "2", "3", "4"],
            "lab": ["p", "q", "p", "q"],
        }
    )
    enc = Encoder(["a", "b", "lab"], "lab").fit(pdf)
    X1 = enc.transform(pdf)
    X2 = enc.transform(pdf)
    assert X1.shape[0] == 4
    assert np.array_equal(X1, X2)
    # one-hot + other + numeric + missing per attr
    assert X1.shape[1] == sum(
        len(enc.cats[a]) + 1 + 2 for a in ("a", "b")
    )


def test_encoder_label_encoding_unseen_is_minus_one():
    train = pd.DataFrame({"a": ["x", "y"], "lab": ["p", "q"]})
    test = pd.DataFrame({"a": ["x", "y"], "lab": ["p", "NEW"]})
    enc = Encoder(["a", "lab"], "lab").fit(train)
    y = enc.encode_labels(test)
    assert y[0] >= 0
    assert y[1] == -1


def test_encoder_numeric_target():
    pdf = pd.DataFrame({"a": ["1"], "lab": ["2.5"]})
    enc = Encoder(["a", "lab"], "lab").fit(pdf)
    assert enc.encode_target(pdf)[0] == pytest.approx(2.5)


def test_encoder_missing_numeric_target_filled_with_mean():
    pdf = pd.DataFrame({"a": ["1", "2"], "lab": ["4.0", None]})
    enc = Encoder(["a", "lab"], "lab").fit(pdf)
    t = enc.encode_target(pdf)
    assert t[1] == pytest.approx(4.0)


def test_gbt_stumps_deterministic_given_seed():
    X, y = _separable_classification(seed=9)
    m1 = GBTStumps(task="classification", seed=4).fit(X, y)
    m2 = GBTStumps(task="classification", seed=4).fit(X, y)
    assert np.array_equal(m1.predict(X), m2.predict(X))
