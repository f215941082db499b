"""ML models and metrics for the Sec. 6 application studies."""
from repro.ml.knn import KNNClassifier
from repro.ml.linreg import LinearRegression
from repro.ml.metrics import (
    expected_shortfall,
    mean_squared_error,
    misclassification_rate,
)
from repro.ml.naive_bayes import MultinomialNB

__all__ = [
    "KNNClassifier",
    "LinearRegression",
    "MultinomialNB",
    "expected_shortfall",
    "mean_squared_error",
    "misclassification_rate",
]
