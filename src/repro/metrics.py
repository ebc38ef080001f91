"""Quality metrics of the evaluation section.

- §8.3 compares the DC sets mined from a sample vs from the full dataset
  with precision / recall / F1 over exact predicate-set identity.
- §8.4 scores against expert ("golden") DCs with **G-recall** = fraction of
  golden DCs returned. We count a golden DC as returned when a mined DC is
  at least as general (its predicate set is a subset — it implies the
  golden DC); ``exact=True`` restricts to predicate-set identity.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable

from .core.dc import DenialConstraint


def _as_sets(dcs: Iterable[DenialConstraint]) -> list[frozenset]:
    return [dc.predicates for dc in dcs]


@dataclass(frozen=True)
class PRF:
    precision: float
    recall: float

    @property
    def f1(self) -> float:
        p, r = self.precision, self.recall
        return 0.0 if p + r == 0 else 2 * p * r / (p + r)


def prf(found: Iterable[DenialConstraint], reference: Iterable[DenialConstraint]) -> PRF:
    fs, rs = set(_as_sets(found)), set(_as_sets(reference))
    if not fs and not rs:
        return PRF(1.0, 1.0)
    tp = len(fs & rs)
    return PRF(
        precision=tp / len(fs) if fs else 0.0,
        recall=tp / len(rs) if rs else 0.0,
    )


def g_recall(
    found: Iterable[DenialConstraint],
    golden: Iterable[DenialConstraint],
    *,
    exact: bool = False,
) -> float:
    fsets = _as_sets(found)
    gsets = _as_sets(golden)
    if not gsets:
        return 1.0
    hit = 0
    for gset in gsets:
        if exact:
            ok = any(f == gset for f in fsets)
        else:
            ok = any(f <= gset for f in fsets)
        hit += ok
    return hit / len(gsets)
