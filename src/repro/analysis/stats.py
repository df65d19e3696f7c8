"""Friedman test + post-hoc Nemenyi analysis (paper Sec. 6, Figure 2).

The paper ranks the 8 algorithms by F-Measure over the 739 paired
samples, rejects the Friedman null hypothesis and reports Nemenyi
critical distance CD = 0.37. scipy is not available offline, so both
tests are implemented directly with numpy; the Nemenyi q_{0.05}
critical values are the standard studentized-range constants.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

#: q_{0.05} for the Nemenyi test, k = 2..10 treatments (Demsar 2006).
_Q_ALPHA_05 = {
    2: 1.960, 3: 2.343, 4: 2.569, 5: 2.728, 6: 2.850,
    7: 2.949, 8: 3.031, 9: 3.102, 10: 3.164,
}


@dataclass(frozen=True)
class FriedmanResult:
    """Outcome of the Friedman rank test over an N x k score matrix."""

    n: int  # samples (similarity graphs)
    k: int  # treatments (algorithms)
    mean_ranks: pd.Series  # per treatment (1 = best)
    chi2: float  # Friedman chi-square statistic
    critical_distance: float  # Nemenyi CD at alpha = 0.05
    reject_null: bool  # chi2 above the chi-square 0.05 critical value


def _chi2_critical_05(dof: int) -> float:
    """chi-square 0.05 critical value via Wilson-Hilferty approximation."""
    z = 1.6448536269514722  # standard normal 95th percentile
    return dof * (1.0 - 2.0 / (9.0 * dof) + z * np.sqrt(2.0 / (9.0 * dof))) ** 3


def rank_matrix(scores: pd.DataFrame, higher_is_better: bool = True) -> pd.DataFrame:
    """Per-row ranks (1 = best), average ranks on ties — as in Demsar."""
    ascending = not higher_is_better
    return scores.rank(axis=1, method="average", ascending=ascending)


def friedman_nemenyi(
    scores: pd.DataFrame, higher_is_better: bool = True
) -> FriedmanResult:
    """Friedman test + Nemenyi CD over an (N samples x k treatments)
    score frame (e.g. F1 per similarity graph per algorithm)."""
    scores = scores.dropna()
    n, k = scores.shape
    if n < 2 or k < 2:
        raise ValueError("need at least 2 samples and 2 treatments")
    ranks = rank_matrix(scores, higher_is_better)
    mean_ranks = ranks.mean(axis=0).sort_values()
    rank_sums = ranks.sum(axis=0)
    chi2 = 12.0 / (n * k * (k + 1)) * float((rank_sums**2).sum()) - 3.0 * n * (k + 1)
    q = _Q_ALPHA_05.get(k)
    if q is None:
        raise ValueError(f"no q_alpha tabulated for k={k}")
    cd = q * np.sqrt(k * (k + 1) / (6.0 * n))
    return FriedmanResult(
        n=n,
        k=k,
        mean_ranks=mean_ranks,
        chi2=float(chi2),
        critical_distance=float(cd),
        reject_null=bool(chi2 > _chi2_critical_05(k - 1)),
    )


def significance_groups(result: FriedmanResult) -> list[tuple[str, str, bool]]:
    """All treatment pairs with whether their rank difference is
    significant (|mean rank difference| >= CD)."""
    names = list(result.mean_ranks.index)
    out = []
    for i, a in enumerate(names):
        for b in names[i + 1 :]:
            diff = abs(result.mean_ranks[a] - result.mean_ranks[b])
            out.append((a, b, bool(diff >= result.critical_distance)))
    return out
