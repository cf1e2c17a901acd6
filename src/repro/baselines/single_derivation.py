"""Single-derivation baseline (Sec. 9.3, Fig. 12b).

Single-derivation why-not approaches (e.g., the Y! system) return one
failed derivation instead of summarizing all of them — fast but
incomplete. We implement it on top of the same batch-sampling machinery
with a target of a single derivation and a small over-sample that is
doubled until a why-not derivation is found.
"""
from __future__ import annotations

from repro.core.ast import Program
from repro.core.unify import PTuple, unify_program
from repro.engine.catalog import Catalog
from repro.engine.eval import evaluate
from repro.patterns.pattern import Pattern
from repro.provenance.annotate import goal_column_names
from repro.sampling.whynot import sample_whynot_rule


def single_derivation(
    catalog: Catalog,
    program: Program,
    t: PTuple,
    seed: int = 0,
    initial_n_os: int = 64,
    max_attempts: int = 8,
) -> Pattern | None:
    """Return one failed derivation of a missing answer matching ``t``
    (as a fully-constant :class:`Pattern`), or ``None`` if none found."""
    result = evaluate(catalog, program)
    for u in unify_program(program, t):
        n_os = initial_n_os
        for attempt in range(max_attempts):
            rs = sample_whynot_rule(
                catalog,
                program,
                u,
                n_s=1,
                seed=seed + attempt,
                result=result,
                max_n_os=n_os,
            )
            rows = rs.sample.limit(1).collect()
            if rows:
                r = rows[0]
                var_cols = [v.name for v in u.unbound]
                goal_cols = goal_column_names(u.n_goals)
                return Pattern(
                    rule_id=u.rule_id,
                    var_names=tuple(var_cols),
                    args=tuple(r[v] for v in var_cols),
                    goals=tuple(bool(r[g]) for g in goal_cols),
                    cp=0.0,
                    count=1,
                )
            n_os *= 4
    return None
