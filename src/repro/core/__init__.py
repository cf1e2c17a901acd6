"""Datalog (UCQ¬<) core: AST, parser, unification, SQL generation."""
from repro.core.ast import (  # noqa: F401
    Atom,
    Comparison,
    Const,
    Program,
    Rule,
    Var,
    parse_program,
    parse_rule,
    vars_in_order,
)
from repro.core.unify import PQuestion, PTuple, parse_ptuple, unify_rule  # noqa: F401
