"""Baseline sliding-window aggregation algorithms the paper compares to."""
from .amta import Amta  # noqa: F401
from .daba import DabaLite  # noqa: F401
from .twostacks import TwoStacksLite  # noqa: F401
