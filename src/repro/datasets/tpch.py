"""TPC-H workload for query r10 (Custs) of Fig. 4, over the provided
TPC-H-lite generators of ``repro.synth_data``.

The paper's r10 joins CUSTOMER ⋈ ORDERS ⋈ LINEITEM and returns customer
name and nation; our TPC-H-lite schema has no customer name, so the head
is (custkey, nationkey) — the join structure and variable counts, which
are what the experiment varies, are preserved.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro import synth_data
from repro.core.ast import Const, Program, Rule, parse_rule

#: Custs(CK, NK) over TPC-H-lite (customer 4 cols, orders 6, lineitem 10).
R10_TPCH = (
    "Custs(CK, NK) :- CUSTOMER(CK, NK, AB, MS), "
    "ORDERS(OK, CK, OS, TP, OD, OP), "
    "LINEITEM(OK, PK, LN, QT, EP, DI, TX, RF, LS, SD)."
)

#: Existential variables of r10 in bindable order (non-join, non-head),
#: excluding date/timestamp columns (constants are drawn from the data).
R10_BINDABLE = ["AB", "MS", "OS", "TP", "OP", "PK", "LN", "QT", "EP", "DI",
                "TX", "RF", "LS"]


def r10_program(n_bound: int = 0, constants: dict[str, object] | None = None) -> Program:
    """r10 with the first ``n_bound`` existential variables bound to
    constants (Fig. 9f varies the number of existential variables)."""
    base = parse_rule(R10_TPCH, rule_id=f"r10b{n_bound}")
    if n_bound == 0:
        return Program((base,))
    if constants is None:
        raise ValueError("constants required when n_bound > 0")
    bind = {v: constants[v] for v in R10_BINDABLE[:n_bound]}
    new_body = []
    for atom in base.body:
        args = tuple(
            Const(bind[a.name]) if getattr(a, "name", None) in bind else a
            for a in atom.args
        )
        new_body.append(atom.__class__(atom.pred, args, atom.negated))
    rule = Rule(base.head, tuple(new_body), base.comparisons, rule_id=base.rule_id)
    return Program((rule,))


def tpch_db(spark: SparkSession, sf: float = 0.001, seed: int = 0) -> dict[str, DataFrame]:
    return {
        "CUSTOMER": synth_data.customer(spark, sf=sf, seed=seed + 2),
        "ORDERS": synth_data.orders(spark, sf=sf, seed=seed + 1),
        "LINEITEM": synth_data.lineitem(spark, sf=sf, seed=seed),
    }


def sample_constants(db: dict[str, DataFrame]) -> dict[str, object]:
    """Constants for binding r10 variables, drawn from the first rows."""
    c = db["CUSTOMER"].limit(1).collect()[0]
    o = db["ORDERS"].limit(1).collect()[0]
    li = db["LINEITEM"].limit(1).collect()[0]
    return {
        "AB": c["c_acctbal"], "MS": c["c_mktsegment"],
        "OS": o["o_orderstatus"], "TP": o["o_totalprice"],
        "OP": o["o_orderpriority"],
        "PK": li["l_partkey"], "LN": li["l_linenumber"], "QT": li["l_quantity"],
        "EP": li["l_extendedprice"], "DI": li["l_discount"], "TX": li["l_tax"],
        "RF": li["l_returnflag"], "LS": li["l_linestatus"],
    }
