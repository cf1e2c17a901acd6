"""Datalog (UCQ¬<) → SQL compiler for the DuckDB oracle.

The Spark engine (``repro.engine``) and this compiler are independent
implementations of UCQ¬< semantics; tests run both over identical input
and diff the sorted rows via ``repro.oracle.assert_equivalent``, so a
broken join/anti-join/filter in the engine is caught by result
inequality, not just "it ran".

Head columns are named ``h0 … h{n-1}`` on both sides.
"""
from __future__ import annotations

from repro.core.ast import Atom, Comparison, Const, Program, Rule, Term, Var


def head_columns(arity: int) -> list[str]:
    """Canonical output column names shared by Spark and DuckDB sides."""
    return [f"h{i}" for i in range(arity)]


def sql_literal(value: object) -> str:
    if isinstance(value, str):
        return "'" + value.replace("'", "''") + "'"
    if isinstance(value, bool):
        return "TRUE" if value else "FALSE"
    return repr(value)


_OP_SQL = {"<": "<", "<=": "<=", "!=": "<>", ">=": ">=", ">": ">", "=": "="}


class _RuleSql:
    def __init__(self, rule: Rule, columns: dict[str, list[str]]):
        self.rule = rule
        self.columns = columns
        self.var_expr: dict[Var, str] = {}
        self.where: list[str] = []
        self.froms: list[str] = []
        self._build()

    def _col(self, pred: str, pos: int) -> str:
        cols = self.columns[pred]
        if pos >= len(cols):
            raise ValueError(f"{pred} has {len(cols)} columns, needs arg {pos}")
        return cols[pos]

    def _build(self) -> None:
        for i, atom in enumerate(self.rule.positive_body()):
            alias = f"t{i}"
            self.froms.append(f"{atom.pred} {alias}")
            for pos, arg in enumerate(atom.args):
                expr = f"{alias}.{self._col(atom.pred, pos)}"
                if isinstance(arg, Const):
                    self.where.append(f"{expr} = {sql_literal(arg.value)}")
                elif arg in self.var_expr:
                    self.where.append(f"{expr} = {self.var_expr[arg]}")
                else:
                    self.var_expr[arg] = expr
        for j, atom in enumerate(self.rule.negative_body()):
            self.where.append(self._not_exists(atom, f"n{j}"))
        for c in self.rule.comparisons:
            self.where.append(
                f"{self._term(c.left)} {_OP_SQL[c.op]} {self._term(c.right)}"
            )

    def _term(self, t: Term) -> str:
        if isinstance(t, Const):
            return sql_literal(t.value)
        if t not in self.var_expr:
            raise ValueError(f"unsafe variable {t.name}")
        return self.var_expr[t]

    def _not_exists(self, atom: Atom, alias: str) -> str:
        conds = []
        for pos, arg in enumerate(atom.args):
            expr = f"{alias}.{self._col(atom.pred, pos)}"
            conds.append(f"{expr} = {self._term(arg)}")
        cond = " AND ".join(conds) if conds else "TRUE"
        return f"NOT EXISTS (SELECT 1 FROM {atom.pred} {alias} WHERE {cond})"

    def select(self) -> str:
        outs = []
        for i, arg in enumerate(self.rule.head.args):
            outs.append(f"{self._term(arg)} AS h{i}")
        where = " AND ".join(self.where) if self.where else "TRUE"
        return (
            f"SELECT DISTINCT {', '.join(outs)} "
            f"FROM {', '.join(self.froms)} WHERE {where}"
        )


def rule_to_sql(rule: Rule, columns: dict[str, list[str]]) -> str:
    """SQL for a single rule; ``columns`` maps predicate → column names."""
    return _RuleSql(rule, columns).select()


def program_to_sql(program: Program, columns: dict[str, list[str]]) -> str:
    """SQL for a UCQ¬< program: UNION (set semantics) of its rules."""
    return " UNION ".join(rule_to_sql(r, columns) for r in program.rules)
