"""Registry of sliding-window aggregation algorithms under test.

Names follow the paper's §7: ``b_fiba4``/``b_fiba8`` are the new bulk
algorithm at MIN_ARITY 4/8; ``nb_fiba4``/``nb_fiba8`` are the non-bulk
FiBA baseline (same tree, bulk operations *emulated by loops* of single
ops, exactly how the paper benchmarks them); ``amta``,
``twostacks_lite`` and ``daba_lite`` are the in-order-only baselines.

Every algorithm exposes the uniform ADT: ``insert(t, v)``, ``evict()``,
``bulk_insert(items)``, ``bulk_evict(t)``, ``query()``,
``query_lowered()``, ``oldest()``, ``youngest()``.
"""
from __future__ import annotations

from typing import Any, Callable, Dict, Iterable, Tuple

from .baselines.amta import Amta
from .baselines.daba import DabaLite
from .baselines.twostacks import TwoStacksLite
from .core.fiba import FibaTree
from .core.monoids import Monoid


class NbFiba(FibaTree):
    """FiBA'19 baseline: bulk operations emulated by single-op loops."""

    def bulk_insert(self, items: Iterable[Tuple[Any, Any]]) -> None:
        for t, v in sorted(items, key=lambda p: p[0]):
            self.insert(t, v)

    def bulk_evict(self, t) -> None:
        while True:
            o = self.oldest()
            if o is None or o > t:
                return
            self.evict()


#: name -> factory(monoid) for every algorithm in the evaluation.
ALGORITHMS: Dict[str, Callable[[Monoid], Any]] = {
    "b_fiba4": lambda m: FibaTree(m, min_arity=4),
    "b_fiba8": lambda m: FibaTree(m, min_arity=8),
    "nb_fiba4": lambda m: NbFiba(m, min_arity=4),
    "nb_fiba8": lambda m: NbFiba(m, min_arity=8),
    "amta": Amta,
    "twostacks_lite": TwoStacksLite,
    "daba_lite": DabaLite,
}

#: Algorithms that tolerate out-of-order insertion (d > 0 experiments).
OOO_ALGORITHMS = ("b_fiba4", "b_fiba8", "nb_fiba4", "nb_fiba8")

#: Algorithms restricted to in-order data (absent from ooo figures).
IN_ORDER_ONLY = ("amta", "twostacks_lite", "daba_lite")


def make(name: str, monoid: Monoid):
    """Instantiate a registered algorithm by its paper name."""
    try:
        return ALGORITHMS[name](monoid)
    except KeyError:
        raise KeyError(f"unknown algorithm {name!r}; available: {sorted(ALGORITHMS)}")
