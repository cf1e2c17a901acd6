"""Evaluating UCQ¬< rules as Spark DataFrame plans.

``successful_derivations`` is the instrumented evaluation of Sec. 4 /
[20, 22]: it returns one row per *successful* rule derivation, keeping
the bindings of every rule variable as columns — this is exactly the
why-provenance of the rule's answers (a successful derivation has all
goals annotated T by Def. 1). ``evaluate`` projects derivations onto
heads and unions rules with set semantics, i.e. plain query evaluation.

Positive literals become (natural) joins, negated literals become
left-anti joins on the literal's variables, comparisons become filters —
all Catalyst-optimized DataFrame operations.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.ast import Atom, Comparison, Const, Program, Rule, Var, vars_in_order
from repro.core.sqlgen import head_columns
from repro.engine.catalog import Catalog

_OP_FN = {
    "<": lambda a, b: a < b,
    "<=": lambda a, b: a <= b,
    "!=": lambda a, b: a != b,
    ">=": lambda a, b: a >= b,
    ">": lambda a, b: a > b,
    "=": lambda a, b: a == b,
}


def atom_df(catalog: Catalog, atom: Atom) -> DataFrame:
    """Distinct bindings of an atom's variables, columns named by variable.

    Constant arguments become filters; a variable repeated inside the
    atom becomes an intra-atom equality filter. The result has one
    column per distinct variable of the atom (set semantics).
    """
    df = catalog.df(atom.pred)
    cols = df.columns
    if atom.arity != len(cols):
        raise ValueError(
            f"atom {atom.pred}/{atom.arity} does not match relation arity {len(cols)}"
        )
    first_col: dict[str, str] = {}
    conds: list[Column] = []
    for pos, arg in enumerate(atom.args):
        c = F.col(cols[pos])
        if isinstance(arg, Const):
            conds.append(c == F.lit(arg.value))
        elif arg.name in first_col:
            conds.append(c == F.col(first_col[arg.name]))
        else:
            first_col[arg.name] = cols[pos]
    for cond in conds:
        df = df.filter(cond)
    if not first_col:  # ground atom: keep a marker row iff any row matches
        return df.limit(1).select(F.lit(1).alias("__exists"))
    return df.select(
        *[F.col(col).alias(var) for var, col in first_col.items()]
    ).distinct()


def comparison_column(c: Comparison) -> Column:
    left = F.lit(c.left.value) if isinstance(c.left, Const) else F.col(c.left.name)
    right = F.lit(c.right.value) if isinstance(c.right, Const) else F.col(c.right.name)
    return _OP_FN[c.op](left, right)


def successful_derivations(catalog: Catalog, rule: Rule) -> DataFrame:
    """One row per successful derivation; columns = rule variables in order."""
    positives = rule.positive_body()
    if not positives:
        raise ValueError("rule must have at least one positive literal")
    acc: DataFrame | None = None
    for atom in positives:
        g = atom_df(catalog, atom)
        if g.columns == ["__exists"]:
            # ground positive goal: succeeds iff the tuple exists
            if acc is None:
                acc = _unit_df(catalog)
            if not _nonempty_marker(g):
                acc = acc.limit(0)
            continue
        if acc is None:
            acc = g
        else:
            shared = [c for c in g.columns if c in acc.columns]
            acc = acc.join(g, on=shared) if shared else acc.crossJoin(g)
    assert acc is not None
    for c in rule.comparisons:
        acc = acc.filter(comparison_column(c))
    for atom in rule.negative_body():
        g = atom_df(catalog, atom)
        if g.columns == ["__exists"]:
            # ground negated goal: rule dies iff the tuple exists
            if g.limit(1).count() > 0:
                acc = acc.limit(0)
            continue
        shared = [c for c in g.columns if c in acc.columns]
        if len(shared) != len(g.columns):
            raise ValueError(
                f"unsafe negation {atom.pred}: variables {set(g.columns) - set(shared)}"
            )
        acc = acc.join(g, on=shared, how="left_anti")
    ordered = [v.name for v in vars_in_order(rule)]
    return acc.select(*ordered).distinct()


def _unit_df(catalog: Catalog) -> DataFrame:
    return catalog.spark.range(1).drop("id")


def _nonempty_marker(df: DataFrame) -> bool:
    return df.limit(1).count() > 0


def head_projection(deriv: DataFrame, rule: Rule) -> DataFrame:
    """Project derivations onto the rule head, columns ``h0 … h{n-1}``."""
    outs = []
    for i, arg in enumerate(rule.head.args):
        col = F.col(arg.name) if isinstance(arg, Var) else F.lit(arg.value)
        outs.append(col.alias(head_columns(rule.head.arity)[i]))
    return deriv.select(*outs).distinct()


def evaluate_rule(catalog: Catalog, rule: Rule) -> DataFrame:
    """Answers of one rule, columns ``h0 … h{n-1}`` (set semantics)."""
    return head_projection(successful_derivations(catalog, rule), rule)


def evaluate(catalog: Catalog, program: Program) -> DataFrame:
    """Answers of a UCQ¬< program: union of its rules, set semantics."""
    out: DataFrame | None = None
    for r in program.rules:
        res = evaluate_rule(catalog, r)
        out = res if out is None else out.unionByName(res)
    assert out is not None
    return out.distinct()
