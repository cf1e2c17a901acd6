"""Random chain/star queries over synthetic relations (Fig. 9a–d).

The paper varies (i) the number of joins and (ii) the number of
variables bound to constants, over 100K-row synthetic tables whose join
graph is a chain or a star. Each relation carries one payload column so
the number of existential variables grows with the join count, and
``n_bound`` payload variables can be pinned to constants.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.ast import Program, parse_rule


def chain_db(
    spark: SparkSession,
    n_joins: int,
    n_rows: int = 1000,
    key_domain: int = 50,
    payload_domain: int = 10,
    seed: int = 0,
) -> dict[str, DataFrame]:
    """Relations C1…C_{n_joins}, each Ci(src, dst, payload)."""
    g = np.random.default_rng(seed)
    out = {}
    for i in range(1, n_joins + 1):
        pdf = pd.DataFrame(
            {
                "src": g.integers(0, key_domain, n_rows),
                "dst": g.integers(0, key_domain, n_rows),
                "payload": g.integers(0, payload_domain, n_rows),
            }
        ).drop_duplicates()
        out[f"C{i}"] = spark.createDataFrame(pdf)
    return out


def chain_query(n_joins: int, n_bound: int = 0) -> Program:
    """Q(X0) :- C1(X0, X1, P1), …, Cm(X_{m-1}, Xm, Pm) with the first
    ``n_bound`` payload variables bound to the constant 0."""
    if not 0 <= n_bound <= n_joins:
        raise ValueError("n_bound must be in [0, n_joins]")
    goals = []
    for i in range(1, n_joins + 1):
        p = "0" if i <= n_bound else f"P{i}"
        goals.append(f"C{i}(X{i - 1}, X{i}, {p})")
    text = f"Q(X0) :- {', '.join(goals)}."
    return Program((parse_rule(text, rule_id=f"chain{n_joins}b{n_bound}"),))


def star_db(
    spark: SparkSession,
    n_dims: int,
    n_rows: int = 1000,
    key_domain: int = 50,
    payload_domain: int = 10,
    seed: int = 0,
) -> dict[str, DataFrame]:
    """A hub H(key, a1…a_{n_dims}) and dimensions Di(ai, payload)."""
    g = np.random.default_rng(seed)
    hub = {"key": g.integers(0, key_domain * 10, n_rows)}
    for i in range(1, n_dims + 1):
        hub[f"a{i}"] = g.integers(0, key_domain, n_rows)
    out = {"H": spark.createDataFrame(pd.DataFrame(hub).drop_duplicates())}
    for i in range(1, n_dims + 1):
        pdf = pd.DataFrame(
            {
                "a": g.integers(0, key_domain, n_rows),
                "payload": g.integers(0, payload_domain, n_rows),
            }
        ).drop_duplicates()
        out[f"D{i}"] = spark.createDataFrame(pdf)
    return out


def star_query(n_dims: int, n_bound: int = 0) -> Program:
    """Q(K) :- H(K, A1…Am), D1(A1, P1), …, Dm(Am, Pm), first ``n_bound``
    payload variables bound to the constant 0."""
    if not 0 <= n_bound <= n_dims:
        raise ValueError("n_bound must be in [0, n_dims]")
    hub_args = ["K"] + [f"A{i}" for i in range(1, n_dims + 1)]
    goals = [f"H({', '.join(hub_args)})"]
    for i in range(1, n_dims + 1):
        p = "0" if i <= n_bound else f"P{i}"
        goals.append(f"D{i}(A{i}, {p})")
    text = f"Q(K) :- {', '.join(goals)}."
    return Program((parse_rule(text, rule_id=f"star{n_dims}b{n_bound}"),))
