"""Core of the reproduction: monoids, the FiBA tree, and bulk ops."""
from .monoids import MONOIDS, PAPER_MONOIDS, Monoid, get as get_monoid  # noqa: F401
from .naive import NaiveSwag  # noqa: F401
from .fiba import FibaTree  # noqa: F401
