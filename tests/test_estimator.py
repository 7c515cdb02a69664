"""MO-GBM estimator: featurization, fit/predict, clipping, fidelity."""
import numpy as np
import pandas as pd
import pytest

from repro.core.literals import UnitLayout
from repro.estimator.mogbm import MOGBMEstimator, state_features
from repro.measures import Measure

MEAS = [
    Measure("m1", "m1", False, lo=0.05),
    Measure("m2", "m2", False, lo=0.01),
]


@pytest.fixture(scope="module")
def layout():
    rng = np.random.default_rng(0)
    pdf = pd.DataFrame(
        {
            "key": np.arange(80),
            "target": rng.integers(0, 2, 80),
            "g": rng.integers(0, 3, 80),
            "x": rng.normal(size=80),
        }
    )
    return UnitLayout.from_universal(pdf, protected={"key", "target"}, max_k=4)


def test_state_features_shape_and_range(layout):
    f = state_features(layout, layout.full_bits())
    assert f.shape == (layout.n_units + 2,)
    assert f[-2] == pytest.approx(1.0)  # full row fraction
    assert f[-1] == pytest.approx(1.0)  # full column fraction


def test_state_features_drop_reduces_fractions(layout):
    bits = list(layout.full_bits())
    bits[layout.val_units["g"][0]] = 0
    f = state_features(layout, tuple(bits))
    assert f[-2] < 1.0
    bits[layout.col_unit["x"]] = 0
    f2 = state_features(layout, tuple(bits))
    assert f2[-1] < 1.0


def test_estimator_learns_bit_effects(layout):
    """Performance driven by one bit must be recoverable."""
    rng = np.random.default_rng(1)
    states, Y = [], []
    for _ in range(60):
        bits = tuple(rng.integers(0, 2, layout.n_units).tolist())
        states.append(bits)
        y1 = 0.8 if bits[0] else 0.2
        Y.append([y1, 0.5])
    X = np.array([state_features(layout, b) for b in states])
    est = MOGBMEstimator(MEAS, n_estimators=30).fit(X, np.array(Y))
    on = tuple([1] * layout.n_units)
    off = tuple([0] + [1] * (layout.n_units - 1))
    p_on = est.predict(state_features(layout, on))
    p_off = est.predict(state_features(layout, off))
    assert p_on[0] > p_off[0] + 0.3


def test_predict_clipped_to_measure_range(layout):
    X = np.random.default_rng(2).uniform(size=(30, layout.n_units + 2))
    Y = np.column_stack([np.full(30, -5.0), np.full(30, 7.0)])
    est = MOGBMEstimator(MEAS, n_estimators=5).fit(X, Y)
    p = est.predict(X[0])
    assert p[0] >= MEAS[0].lo
    assert p[1] <= 1.0


def test_predict_single_and_batch(layout):
    rng = np.random.default_rng(3)
    X = rng.uniform(size=(40, layout.n_units + 2))
    Y = rng.uniform(0.1, 0.9, size=(40, 2))
    est = MOGBMEstimator(MEAS, n_estimators=5).fit(X, Y)
    single = est.predict(X[0])
    batch = est.predict(X[:5])
    assert single.shape == (2,)
    assert batch.shape == (5, 2)
    assert np.allclose(batch[0], single)


def test_mse_reports_fit_quality(layout):
    rng = np.random.default_rng(4)
    X = rng.uniform(size=(60, layout.n_units + 2))
    Y = np.column_stack([X[:, 0], X[:, 1]]).clip(0.05, 1.0)
    est = MOGBMEstimator(MEAS, n_estimators=40).fit(X, Y)
    assert est.mse(X, Y) < 0.02


def test_seeded_estimator_accurate_on_training_states(house_ctx):
    """The paper reports small estimator MSE on observed states; check
    our MO-GBM reproduces the training performance pattern."""
    house_ctx.refresh_estimator()  # cover states added by other tests
    X = np.array(
        [state_features(house_ctx.layout, b) for b in house_ctx.tests]
    )
    Y = np.array(
        [pv.vector(house_ctx.measures) for pv in house_ctx.tests.values()]
    )
    assert house_ctx.estimator.mse(X, Y) < 0.02
