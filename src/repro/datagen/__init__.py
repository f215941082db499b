"""Synthetic stream generators for the Sec. 6 experiments."""
from repro.datagen import batches
from repro.datagen.gaussian_mixture import GaussianMixtureStream
from repro.datagen.modes import ABNORMAL, NORMAL, Periodic, SingleEvent
from repro.datagen.regression import RegressionStream
from repro.datagen.usenet import UsenetStream

__all__ = [
    "ABNORMAL",
    "NORMAL",
    "GaussianMixtureStream",
    "Periodic",
    "RegressionStream",
    "SingleEvent",
    "UsenetStream",
    "batches",
]
