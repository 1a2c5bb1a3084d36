"""Probabilistic classifier substrate.

The paper trains scikit-learn SVC (with probabilities) / Weka Logistic
Regression on <=500 labelled candidate pairs. Neither library ships in this
container, so we implement a deterministic L2-regularised logistic regression
(IRLS/Newton) in NumPy — the paper reports LR gives "almost identical
results" to SVC. Training data is tiny and collected to the driver; scoring
is a closed-form sigmoid compiled to a Spark column expression, so the hot
path stays inside Catalyst.
"""
from repro.classifier.logistic import LogisticModel, fit_logistic  # noqa: F401
from repro.classifier.training import match_mask, sample_balanced  # noqa: F401
