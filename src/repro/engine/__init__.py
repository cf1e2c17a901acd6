"""Spark DataFrame evaluation engine for UCQ¬< Datalog."""
from repro.engine.catalog import Catalog  # noqa: F401
from repro.engine.eval import (  # noqa: F401
    evaluate,
    evaluate_rule,
    successful_derivations,
)
