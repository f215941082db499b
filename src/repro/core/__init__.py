"""Core (single-node) sampling algorithms from the paper."""
from repro.core.brs import BRS
from repro.core.btbs import BTBS
from repro.core.chao import BChao
from repro.core.downsample import downsample
from repro.core.latent import LatentSample, frac
from repro.core.rtbs import RTBS
from repro.core.sliding import SlidingWindow
from repro.core.ttbs import TTBS

__all__ = [
    "BRS",
    "BTBS",
    "BChao",
    "LatentSample",
    "RTBS",
    "SlidingWindow",
    "TTBS",
    "downsample",
    "frac",
]
