"""TabularTask: featurization, deterministic split, degenerate guards,
and the deterministic training-cost model."""
import numpy as np
import pandas as pd
import pytest

from repro.ml.forest import RandomForestClassifier
from repro.tasks import CLASSIFICATION, REGRESSION, TabularTask, _featurize


def _mk_task(kind=CLASSIFICATION, time_unit=None):
    return TabularTask(
        name="t",
        kind=kind,
        target="target",
        key="key",
        model_factory=lambda: RandomForestClassifier(n_estimators=5, seed=0),
        time_unit=time_unit,
    )


def _pdf(n=200, seed=0):
    rng = np.random.default_rng(seed)
    x = rng.normal(size=n)
    return pd.DataFrame(
        {
            "key": np.arange(1, n + 1),
            "target": (x > 0).astype(int),
            "x": x,
            "cat": rng.choice(["a", "b", "c"], n),
            "withnan": np.where(rng.random(n) < 0.3, np.nan, x),
        }
    )


def test_featurize_encodes_categories():
    pdf = pd.DataFrame({"c": ["a", "b", "a", None]})
    X = _featurize(pdf, ["c"])
    assert X.shape == (4, 1)
    assert np.isfinite(X).all()  # null imputed
    assert X[0, 0] == X[2, 0]


def test_featurize_imputes_median():
    pdf = pd.DataFrame({"v": [1.0, np.nan, 3.0]})
    X = _featurize(pdf, ["v"])
    assert X[1, 0] == pytest.approx(2.0)


def test_featurize_empty_columns():
    pdf = pd.DataFrame({"v": [1.0, 2.0]})
    assert _featurize(pdf, []).shape == (2, 0)


def test_split_deterministic_by_key():
    task = _mk_task()
    pdf = _pdf()
    tr1, te1 = task.split(pdf)
    tr2, te2 = task.split(pdf.sample(frac=1.0, random_state=1))
    assert set(te1["key"]) == set(te2["key"])
    assert set(tr1["key"]).isdisjoint(set(te1["key"]))


def test_split_fraction_near_expected():
    task = _mk_task()
    _tr, te = task.split(_pdf(1000))
    assert 0.15 < len(te) / 1000 < 0.25


def test_evaluate_classification_keys():
    raw = _mk_task().evaluate(_pdf())
    for k in ("acc", "precision", "recall", "f1", "auc", "train_time",
              "fisher", "mi", "n_rows", "n_cols"):
        assert k in raw
    assert 0 <= raw["acc"] <= 1


def test_evaluate_regression_keys():
    task = TabularTask(
        name="r",
        kind=REGRESSION,
        target="target",
        key="key",
        model_factory=lambda: __import__(
            "repro.ml.linear", fromlist=["LinearRegression"]
        ).LinearRegression(),
    )
    pdf = _pdf()
    pdf["target"] = pdf["x"] * 2.0
    raw = task.evaluate(pdf)
    for k in ("mse", "mae", "rmse", "r2", "acc"):
        assert k in raw
    assert raw["r2"] > 0.9


def test_degenerate_too_few_rows():
    raw = _mk_task().evaluate(_pdf(10))
    assert raw["acc"] == 0.0 and raw["f1"] == 0.0


def test_degenerate_single_class():
    pdf = _pdf()
    pdf["target"] = 1
    raw = _mk_task().evaluate(pdf)
    assert raw["acc"] == 0.0


def test_degenerate_no_features():
    pdf = _pdf()[["key", "target"]]
    raw = _mk_task().evaluate(pdf)
    assert raw["n_cols"] == 0 and raw["acc"] == 0.0


def test_deterministic_time_unit():
    task = _mk_task(time_unit=1e-6)
    pdf = _pdf()
    r1 = task.evaluate(pdf)
    r2 = task.evaluate(pdf)
    assert r1["train_time"] == r2["train_time"]
    n_train = len(task.split(pdf.dropna(subset=["target"]))[0])
    assert r1["train_time"] == pytest.approx(1e-6 * n_train * 3)


def test_wall_time_positive_without_unit():
    raw = _mk_task(time_unit=None).evaluate(_pdf())
    assert raw["train_time"] > 0


def test_nan_targets_dropped():
    pdf = _pdf()
    pdf.loc[:20, "target"] = np.nan
    raw = _mk_task().evaluate(pdf)
    assert raw["n_rows"] <= len(pdf) - 20
