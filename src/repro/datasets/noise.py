"""Noise injection for the qualitative analysis (paper §8.4).

Two dirty variants of each dataset:

- ``spread``: every cell is modified with probability ``rate`` (paper:
  0.001); a modified cell gets, with equal probability, either a random
  value from the column's active domain or a "typo".
- ``skewed``: the same cell process, but restricted to a ``rate`` fraction
  of the *tuples* — errors concentrate in few rows. Within a chosen row
  each cell is modified with probability ``cell_prob``.

Typos: strings get a character appended; numerics get a digit-shift
(``x → 10x + d``), mimicking an entry error while keeping the dtype.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _typo(value, g: np.random.Generator):
    if isinstance(value, str):
        return value + chr(ord("a") + int(g.integers(0, 26)))
    if isinstance(value, (bool, np.bool_)):
        return not value
    if isinstance(value, (int, np.integer)):
        return int(value) * 10 + int(g.integers(0, 10))
    if isinstance(value, (float, np.floating)):
        return float(value) * 10 + int(g.integers(0, 10))
    return value


def add_noise(
    pdf: pd.DataFrame,
    *,
    rate: float = 0.001,
    mode: str = "spread",
    cell_prob: float = 0.5,
    typo_frac: float = 0.5,
    seed: int = 0,
) -> pd.DataFrame:
    """Return a dirty copy of ``pdf`` (§8.4 noise process)."""
    if mode not in ("spread", "skewed"):
        raise ValueError("mode must be 'spread' or 'skewed'")
    g = np.random.default_rng(seed)
    out = pdf.copy()
    n = len(out)
    cols = list(out.columns)
    domains = {c: out[c].to_numpy() for c in cols}

    if mode == "spread":
        cell_sel = g.random((n, len(cols))) < rate
    else:
        k = max(1, int(round(rate * n)))
        rows = g.choice(n, size=k, replace=False)
        cell_sel = np.zeros((n, len(cols)), dtype=bool)
        cell_sel[rows] = g.random((k, len(cols))) < cell_prob
        # guarantee at least one modified cell per chosen row
        for r in rows:
            if not cell_sel[r].any():
                cell_sel[r, int(g.integers(0, len(cols)))] = True

    for ci, c in enumerate(cols):
        idxs = np.nonzero(cell_sel[:, ci])[0]
        for r in idxs:
            if g.random() < typo_frac:
                newv = _typo(out.at[r, c], g)
            else:
                newv = domains[c][int(g.integers(0, n))]
            out.at[r, c] = newv
    return out
