"""Top-k summary construction (Sec. 8.2).

``topk_bestfirst`` is the paper's algorithm: a priority queue of
candidate pattern sets ordered by a score *upper* bound; candidates grow
one pattern at a time; a complete (size-k) candidate whose score lower
bound dominates every remaining upper bound is provably optimal w.r.t.
the bounds. If the search exhausts its pop budget without a proof, the
paper's fallback heuristic returns the complete candidate with the
highest (sc̲ + sc̄)/2.

``topk_exact`` (brute force over the sample, exact cp via SampleStore)
and ``topk_greedy`` exist to validate and to seed comparisons.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass
from itertools import combinations
from typing import Sequence

from repro.patterns.pattern import Pattern
from repro.summarize.bounds import cp_lower, cp_upper
from repro.summarize.metrics import SampleStore, harmonic, info_of_set


@dataclass
class SearchResult:
    """Outcome of a top-k search."""

    patterns: tuple[Pattern, ...]
    score_lb: float
    score_ub: float
    proved_optimal: bool
    pops: int


def _bounds(
    cand: Sequence[Pattern], k: int, max_cp: float, max_info: float
) -> tuple[float, float]:
    """(sc̲, sc̄) for a candidate of size ≤ k. Incomplete candidates are
    bounded by best-case extensions (remaining patterns non-overlapping
    with maximal completeness/informativeness); their lower bound is 0 —
    termination only ever relies on *complete* candidates' lower bounds."""
    j = len(cand)
    cp_u = cp_upper(cand)
    if j < k:
        cp_u = min(1.0, cp_u + (k - j) * max_cp)
        info_u = (sum(p.info() for p in cand) + (k - j) * max_info) / k
        return 0.0, harmonic(cp_u, info_u)
    info = info_of_set(cand)
    lb = harmonic(cp_lower(cand), info)
    ub = harmonic(cp_u, info)
    return min(lb, ub), ub


def topk_bestfirst(
    patterns: Sequence[Pattern], k: int, max_pops: int = 100_000
) -> SearchResult:
    """Best-first search for the top-k summary using completeness bounds.

    A greedy solution seeds the incumbent; candidates whose upper bound
    cannot beat the incumbent's lower bound are pruned at push time, so
    the queue stays small even for k = 10 over dozens of patterns.
    """
    pats = sorted(patterns, key=lambda p: (-p.cp, -p.info()))
    if not pats:
        raise ValueError("no patterns to summarize")
    if len(pats) <= k:
        lb, ub = _bounds(pats, len(pats), 0.0, 0.0)
        return SearchResult(tuple(pats), lb, ub, True, 0)
    max_cp = max(p.cp for p in pats)
    max_info = max(p.info() for p in pats)

    greedy = topk_greedy(pats, k)
    # incumbent: (index tuple or None, lb, ub); greedy's indices unknown —
    # recover them for a well-formed result
    greedy_idx = tuple(sorted(pats.index(p) for p in greedy.patterns))
    best_complete: tuple[tuple[int, ...], float, float] = (
        greedy_idx, greedy.score_lb, greedy.score_ub
    )
    eps = 1e-12

    # heap entries: (-ub, tiebreak, candidate index tuple, lb)
    heap: list[tuple[float, int, tuple[int, ...], float]] = []
    tiebreak = 0
    for i in range(len(pats)):
        lb, ub = _bounds([pats[i]], k, max_cp, max_info)
        if ub > best_complete[1] + eps:
            heapq.heappush(heap, (-ub, tiebreak, (i,), lb))
            tiebreak += 1

    pops = 0
    proved = False
    while heap and pops < max_pops:
        neg_ub, _, cand, lb = heapq.heappop(heap)
        ub = -neg_ub
        pops += 1
        if ub <= best_complete[1] + eps:
            # nothing left can beat the incumbent — optimal w.r.t. bounds
            proved = True
            break
        if len(cand) == k:
            if (lb + ub) > (best_complete[1] + best_complete[2]):
                best_complete = (cand, lb, ub)
            continue
        for i in range(cand[-1] + 1, len(pats)):
            nxt = cand + (i,)
            nlb, nub = _bounds([pats[j] for j in nxt], k, max_cp, max_info)
            if len(nxt) == k and (nlb + nub) > (
                best_complete[1] + best_complete[2]
            ):
                best_complete = (nxt, nlb, nub)
            if len(nxt) < k and nub > best_complete[1] + eps:
                heapq.heappush(heap, (-nub, tiebreak, nxt, nlb))
                tiebreak += 1
    else:
        proved = not heap  # queue drained: incumbent dominates everything

    c, clb, cub = best_complete
    return SearchResult(tuple(pats[i] for i in c), clb, cub, proved, pops)


def topk_greedy(patterns: Sequence[Pattern], k: int) -> SearchResult:
    """Greedy top-k by marginal bound midpoint — cheap fallback seed."""
    pats = list(patterns)
    chosen: list[Pattern] = []
    while pats and len(chosen) < k:
        best_i, best_v = 0, float("-inf")
        for i, p in enumerate(pats):
            cand = chosen + [p]
            lb, ub = _bounds(cand, len(cand), 0.0, 0.0)
            v = (lb + ub) / 2
            if v > best_v:
                best_i, best_v = i, v
        chosen.append(pats.pop(best_i))
    lb, ub = _bounds(chosen, len(chosen), 0.0, 0.0)
    return SearchResult(tuple(chosen), lb, ub, False, 0)


def topk_exact(
    patterns: Sequence[Pattern], k: int, store: SampleStore
) -> SearchResult:
    """Brute-force argmax of the exact-over-sample score (test oracle)."""
    pats = list(patterns)
    kk = min(k, len(pats))
    best: tuple[Pattern, ...] | None = None
    best_score = float("-inf")
    for combo in combinations(pats, kk):
        s = store.score_of_set(combo)
        if s > best_score:
            best, best_score = combo, s
    assert best is not None
    return SearchResult(best, best_score, best_score, True, 0)
