"""ADCEnum — enumeration of minimal approximate hitting sets / ADCs.

Implements Figures 3–5 of the paper: the MMCS algorithm of Murakami & Uno
[32] extended with

- an approximate base case ``1 − f(D,S) ≤ ε`` plus an explicit
  ``IsMinimal`` check (monotonicity makes one-element removals sufficient),
- a second recursive branch that *skips* the chosen uncovered set F,
  guarded by the ``canHit`` flags and the ``WillCover`` monotonicity prune,
- ``RemoveRedundantPreds``: after adding predicate ``e`` to S, candidates
  differing from ``e`` only by the operator are dropped for the subtree,
- pivot selection: the uncovered set with the **maximal** intersection with
  ``cand`` (paper §6.2; ``choose="min"`` reproduces [32] for Figure 10).

With ``eps=0`` and ``F1`` the algorithm degenerates to exact MMCS — tests
exploit this. ``groups=None`` keeps the DC-specific pruning off, yielding a
generic minimal-approximate-hitting-set enumerator (paper contribution 2).

The per-node work (pivot scoring, WillCover, UpdateCritUncov) is vectorized
over a dense evidence×predicate membership matrix — the Python counterpart
of the bit-parallel set operations a native implementation would use.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from .dc import DenialConstraint
from .evidence import EvidenceSet
from .functions import ApproximationFunction, UncoveredView


class EnumerationLimit(Exception):
    """Raised internally to unwind when max_results/deadline is reached."""


@dataclass
class EnumStats:
    nodes: int = 0
    outputs: int = 0
    f_evals: int = 0
    seconds: float = 0.0
    truncated: bool = False


class _LazyIndices:
    """Iterates the current uncovered indices without materializing them
    unless an approximation function actually needs them (f2/f3 do; f1
    reads only the precomputed weight)."""

    __slots__ = ("arr", "extra")

    def __init__(self, arr: np.ndarray, extra=()):
        self.arr = arr
        self.extra = extra

    def __iter__(self):
        yield from np.nonzero(self.arr)[0].tolist()
        yield from self.extra


class ADCEnum:
    """One enumeration run; use :func:`adc_enum` for the functional API."""

    def __init__(
        self,
        ev: EvidenceSet,
        f: ApproximationFunction,
        eps: float,
        *,
        choose: str = "max",
        groups: list[tuple[int, ...]] | None = None,
        n_elements: int | None = None,
        max_results: int | None = None,
        timeout_s: float | None = None,
    ):
        self.ev = ev
        self.f = f
        self.eps = eps
        if choose not in ("max", "min"):
            raise ValueError("choose must be 'max' or 'min'")
        self.choose = choose
        self.n_elements = n_elements if n_elements is not None else len(ev.space)
        # groups[e] = other predicate ids differing from e only by operator
        self.groups = groups if groups is not None else ev.space.group_others
        self.max_results = max_results
        self.timeout_s = timeout_s
        self.results: list[frozenset[int]] = []
        self.stats = EnumStats()
        # dense membership matrix: M[i, e] = 1 iff predicate e ∈ evidence set i
        n_sets = len(ev.masks)
        self.M = np.zeros((n_sets, self.n_elements), dtype=np.uint8)
        for i, m in enumerate(ev.masks):
            for e in range(self.n_elements):
                if m >> e & 1:
                    self.M[i, e] = 1
        self.Mb = self.M.astype(bool)
        self.counts = np.asarray(ev.counts, dtype=np.int64)

    # -- helpers --------------------------------------------------------------

    def _passes(self, view) -> bool:
        self.stats.f_evals += 1
        return self.f.passes(self.ev, view, self.eps)

    def _is_minimal(self, S: list[int]) -> bool:
        """IsMinimal (Figure 5): S∖{e} must fail for every e ∈ S."""
        for e in S:
            crit_e = self.crit.get(e)
            extra = crit_e.tolist() if crit_e is not None else ()
            w = self.uncov_weight + (
                int(self.counts[crit_e].sum()) if crit_e is not None else 0
            )
            view = UncoveredView(_LazyIndices(self.uncov, extra), w)
            if self._passes(view):
                return False
        return True

    def _choose_f(self) -> int | None:
        """Pivot: uncovered, choosable, with max/min |F ∩ cand| > 0."""
        rows = self.uncov & self.canhit
        idx = np.nonzero(rows)[0]
        if idx.size == 0:
            return None
        inter = self.M[idx] @ self.cand_u8
        ok = inter > 0
        if not ok.any():
            return None
        if self.choose == "max":
            k = int(np.argmax(np.where(ok, inter, -1)))
        else:
            k = int(np.argmin(np.where(ok, inter, np.iinfo(np.int64).max)))
        return int(idx[k])

    def _check_limits(self) -> None:
        if self.max_results is not None and len(self.results) >= self.max_results:
            self.stats.truncated = True
            raise EnumerationLimit
        if self.timeout_s is not None and time.perf_counter() - self._t0 > self.timeout_s:
            self.stats.truncated = True
            raise EnumerationLimit

    # -- main recursion (Figure 4) --------------------------------------------

    def run(self) -> list[frozenset[int]]:
        n_sets = len(self.ev.masks)
        self.uncov = np.ones(n_sets, dtype=bool)
        self.uncov_weight = int(self.counts.sum())
        self.canhit = np.ones(n_sets, dtype=bool)
        self.cand = np.ones(self.n_elements, dtype=bool)
        self.cand_u8 = np.ones(self.n_elements, dtype=np.uint8)
        self.crit: dict[int, np.ndarray] = {}
        self._t0 = time.perf_counter()
        try:
            self._recurse([])
        except EnumerationLimit:
            pass
        self.stats.seconds = time.perf_counter() - self._t0
        self.stats.outputs = len(self.results)
        return self.results

    def _set_cand(self, ids, value: bool) -> None:
        self.cand[ids] = value
        self.cand_u8[ids] = 1 if value else 0

    def _recurse(self, S: list[int]) -> None:
        self.stats.nodes += 1
        self._check_limits()

        # base case (lines 1-3): threshold met → output iff minimal; any
        # extension would be non-minimal, so return either way
        if self._passes(UncoveredView(_LazyIndices(self.uncov), self.uncov_weight)):
            if self._is_minimal(S):
                self.results.append(frozenset(S))
                self._check_limits()
            return

        fi = self._choose_f()  # line 4
        if fi is None:  # lines 5-6
            return
        frow = self.Mb[fi]

        # ---- branch 1 (lines 7-12): do NOT hit F -----------------------------
        removed = np.nonzero(frow & self.cand)[0]
        self._set_cand(removed, False)
        # cand-disjoint uncovered sets: both the canHit update and WillCover
        # need them (UpdateCanCover marks them unhittable; WillCover sums them)
        unc_idx = np.nonzero(self.uncov)[0]
        disjoint = unc_idx[(self.M[unc_idx] @ self.cand_u8) == 0]
        flipped = disjoint[self.canhit[disjoint]]
        self.canhit[flipped] = False  # UpdateCanCover
        will_weight = int(self.counts[disjoint].sum())
        if self._passes(UncoveredView(disjoint.tolist(), will_weight)):  # WillCover
            self._recurse(S)
        self.canhit[flipped] = True  # line 12
        self._set_cand(removed, True)  # line 11

        # ---- branch 2 (lines 13-22): hit F -----------------------------------
        C = np.nonzero(frow & self.cand)[0].tolist()
        self._set_cand(C, False)
        readd: list[int] = []
        for e in C:
            ecol = self.Mb[:, e]
            # UpdateCritUncov (Figure 3)
            newly = np.nonzero(ecol & self.uncov)[0]
            self.uncov[newly] = False
            self.uncov_weight -= int(self.counts[newly].sum())
            self.crit[e] = newly
            moved: dict[int, np.ndarray] = {}
            ok = True
            for u in S:
                cu = self.crit[u]
                mv_mask = ecol[cu]
                if mv_mask.any():
                    moved[u] = cu[mv_mask]
                    self.crit[u] = cu[~mv_mask]
                if self.crit[u].size == 0:
                    ok = False  # u no longer critical anywhere → prune (line 17)
            if ok:
                # RemoveRedundantPreds: same attribute pair, other operator
                grp = [g for g in self.groups[e] if self.cand[g]]
                self._set_cand(grp, False)
                self._recurse(S + [e])
                self._set_cand(grp, True)
                # line 20: add e back only when the crit test succeeded
                readd.append(e)
                self._set_cand([e], True)
            # line 21: undo UpdateCritUncov
            self.uncov[newly] = True
            self.uncov_weight += int(self.counts[newly].sum())
            del self.crit[e]
            for u, mv in moved.items():
                self.crit[u] = np.concatenate([self.crit[u], mv])
        # line 22: restore cand to its state on entry to the loop
        self._set_cand([e for e in C if e not in readd], True)


def adc_enum(
    ev: EvidenceSet,
    f: ApproximationFunction,
    eps: float,
    **kw,
) -> tuple[list[frozenset[int]], EnumStats]:
    """Enumerate minimal approximate hitting sets of ``ev`` w.r.t. f, ε."""
    algo = ADCEnum(ev, f, eps, **kw)
    return algo.run(), algo.stats


def hitting_sets_to_dcs(
    ev: EvidenceSet, hitting_sets: list[frozenset[int]]
) -> list[DenialConstraint]:
    """Map hitting-set-side predicate id sets to DCs (complement predicates).

    Hitting sets containing a predicate with no complement in the space are
    skipped (cannot be stated as a DC over P_R), as is the empty set.
    """
    space = ev.space
    out = []
    for hs in hitting_sets:
        if not hs:
            continue
        comp = [space.complement_idx[e] for e in hs]
        if any(c is None for c in comp):
            continue
        out.append(DenialConstraint(frozenset(space.predicates[c] for c in comp)))
    return out
