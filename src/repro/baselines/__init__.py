"""Baseline community-search models the paper compares against."""
from .ctc import ctc  # noqa: F401
from .psa import psa  # noqa: F401
