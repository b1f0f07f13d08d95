"""Spark dataflow integration of the FiBA sliding-window operator."""
from .operator import sliding_aggregate  # noqa: F401
from .stateful import MicroBatchDriver, stateful_sliding_aggregate  # noqa: F401
from .spark_baseline import RecomputeBaseline  # noqa: F401
