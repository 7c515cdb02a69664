"""Performance estimation substrate (paper §2 "Estimators").

The paper valuates most explored states with a surrogate instead of
retraining M: "we use a multi-output Gradient Boosting Model [34] that
allows us to obtain the performance vector by a single call". Here the
surrogate is our numpy multi-output
:class:`repro.ml.boosting.GradientBoostingRegressor` over state
features (the bitmap L plus retained-row/column fractions), trained on
the seed tests T and refreshed as new true valuations arrive.
"""
from repro.estimator.mogbm import MOGBMEstimator, state_features

__all__ = ["MOGBMEstimator", "state_features"]
