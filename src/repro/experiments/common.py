"""Shared helpers for experiment harnesses: bindings, sizes, printing."""
from __future__ import annotations

from typing import Sequence

from repro.core.ast import Const, Program
from repro.core.unify import PTuple, unify_program
from repro.engine.catalog import Catalog
from repro.engine.eval import evaluate
from repro.provenance.whynot_full import variable_domain


def bind_first_answer(
    catalog: Catalog, program: Program, template: PTuple, positions: Sequence[int]
) -> PTuple:
    """Fill ``positions`` of a p-tuple template with the corresponding
    head values of the first existing answer (for Why questions)."""
    rows = evaluate(catalog, program).limit(1).collect()
    if not rows:
        raise ValueError("query has no answers to bind a why question to")
    row = rows[0]
    args = list(template.args)
    for i in positions:
        args[i] = Const(row[f"h{i}"])
    return PTuple(template.pred, tuple(args))


def whynot_space(catalog: Catalog, program: Program, t: PTuple) -> float:
    """Derivation-space size Σ_rules Π |𝔻_v| — the provenance size the
    paper reports on the upper x-axis of Figs. 6–9 (ignores θ_join)."""
    total = 0.0
    for u in unify_program(program, t):
        prod = 1.0
        for var in u.unbound:
            prod *= variable_domain(catalog, u, var).count()
        total += prod
    return total


def format_rows(rows: list[dict], columns: list[str] | None = None) -> str:
    """Render result rows as a fixed-width text table."""
    if not rows:
        return "(no rows)"
    cols = columns or list(rows[0].keys())
    cells = [[_fmt(r.get(c)) for c in cols] for r in rows]
    widths = [
        max(len(c), *(len(row[i]) for row in cells)) for i, c in enumerate(cols)
    ]
    lines = ["  ".join(c.ljust(w) for c, w in zip(cols, widths))]
    lines.append("  ".join("-" * w for w in widths))
    for row in cells:
        lines.append("  ".join(c.ljust(w) for c, w in zip(row, widths)))
    return "\n".join(lines)


def _fmt(v: object) -> str:
    if v is None:
        return "timeout"
    if isinstance(v, float):
        if v != 0 and (abs(v) >= 1e6 or abs(v) < 1e-3):
            return f"{v:.2e}"
        return f"{v:.3f}"
    return str(v)
