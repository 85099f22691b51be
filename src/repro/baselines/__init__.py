"""Baseline CS methods the paper compares against (§VII-A)."""
from .acq import acq_search
from .atc import locatc_search
from .common import BaselineResult
from .vac import evac_search, vac_search

__all__ = [
    "BaselineResult",
    "acq_search",
    "evac_search",
    "locatc_search",
    "vac_search",
]
