"""Over-sampling size n_OS (Sec. 5.3).

Batch sampling must fix the sample size upfront, but some generated
derivations derive *existing* answers (and are filtered out) or violate
variable-variable predicates. n_OS is chosen so that, with probability
≥ P_success, at least n_S of the n_OS generated derivations survive:
the smallest n with P(Binomial(n, p_prov) ≥ n_S) ≥ P_success, then
inflated by the estimated selectivity of θ_join predicates.

The binomial survival function is computed exactly (log-space recurrence
for the pmf + logsumexp — no scipy dependency), matching the
binomial-handbook algorithm the paper cites [1, 30].
"""
from __future__ import annotations

import math

import numpy as np

from repro.core.ast import Comparison, Var
from repro.core.unify import UnifiedRule

#: Textbook default selectivities for variable-variable comparisons.
_SELECTIVITY = {"<": 0.5, "<=": 0.5, ">": 0.5, ">=": 0.5, "!=": 0.95, "=": 0.05}


def binom_sf(k: int, n: int, p: float) -> float:
    """P(X ≥ k) for X ~ Binomial(n, p), exact, numerically stable."""
    if k <= 0:
        return 1.0
    if k > n:
        return 0.0
    if p >= 1.0:
        return 1.0
    if p <= 0.0:
        return 0.0
    # log pmf at i = k, then recurrence pmf(i+1)/pmf(i) = (n-i)/(i+1) · p/(1-p)
    logpmf_k = (
        math.lgamma(n + 1)
        - math.lgamma(k + 1)
        - math.lgamma(n - k + 1)
        + k * math.log(p)
        + (n - k) * math.log1p(-p)
    )
    i = np.arange(k, n, dtype=np.float64)
    ratios = np.log(n - i) - np.log(i + 1) + math.log(p) - math.log1p(-p)
    logpmf = logpmf_k + np.concatenate(([0.0], np.cumsum(ratios)))
    m = logpmf.max()
    return float(min(1.0, math.exp(m) * np.exp(logpmf - m).sum()))


def min_oversample_size(n_s: int, p: float, p_success: float = 0.999) -> int:
    """Smallest n_OS with P(Binomial(n_OS, p) ≥ n_S) ≥ P_success."""
    if not (0.0 < p <= 1.0):
        raise ValueError(f"p_prov must be in (0, 1], got {p}")
    if n_s <= 0:
        raise ValueError("n_S must be positive")
    if p == 1.0:
        return n_s
    lo, hi = n_s, max(n_s, int(math.ceil(2 * n_s / p)) + 10)
    while binom_sf(n_s, hi, p) < p_success:
        lo = hi
        hi *= 2
        if hi > 1 << 34:  # pragma: no cover - guard against degenerate p
            raise ValueError("over-sampling size diverged; p_prov too small")
    while lo < hi:
        mid = (lo + hi) // 2
        if binom_sf(n_s, mid, p) >= p_success:
            hi = mid
        else:
            lo = mid + 1
    return lo


def comparison_selectivity(comparisons: list[Comparison]) -> float:
    """Estimated combined selectivity of θ_join predicates (Sec. 5.3,
    "Handling Predicates") using standard textbook constants."""
    sel = 1.0
    for c in comparisons:
        sel *= _SELECTIVITY[c.op]
    return sel


def p_prov_estimate(
    unified: UnifiedRule,
    n_existing_matching: int,
    head_var_domain_sizes: dict[str, int],
) -> float:
    """p_prov = 1 − p_notProv (Sec. 5.3).

    A random derivation's head is determined by its head-variable
    bindings; each of the ``n_existing_matching`` existing answers
    matching t accounts for Π(non-head domains) derivations, so
    p_notProv = n_ex / Π |𝔻_v| over *unbound head* variables.
    """
    head_unbound = [
        a for a in unified.rule.head.args if isinstance(a, Var)
    ]
    denom = 1
    seen: set[str] = set()
    for v in head_unbound:
        if v.name in seen:
            continue
        seen.add(v.name)
        if v.name not in head_var_domain_sizes:
            raise KeyError(f"missing domain size for head variable {v.name}")
        denom *= head_var_domain_sizes[v.name]
    if denom == 0:
        return 1.0
    p_not = min(1.0, n_existing_matching / denom)
    return max(1e-12, 1.0 - p_not)
