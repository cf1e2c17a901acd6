"""Synthetic crime-witness database for the Artemis comparison
(Sec. 9.3, Fig. 12a).

Schema and query from the Artemis VM example:
  CrimeDesc(T, N, C, H) :- CRIME(T, S), WITNESS(N, S),
                           SAWPERSON(N, H, C), PERSON(M, H, C), S > 97.

The provenance question binds T='trespassing', N='Aarongolden',
C='MidnightBlue', H='lavender'; the generator guarantees that answer is
missing ('Aarongolden' only witnesses severities ≤ 97).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.ast import Program, parse_rule

CRIMEDESC = (
    "CrimeDesc(T, N, C, H) :- CRIME(T, S), WITNESS(N, S), "
    "SAWPERSON(N, H, C), PERSON(M, H, C), S > 97."
)

HAIR = ["lavender", "black", "blond", "red", "gray"]
CLOTH = ["MidnightBlue", "Crimson", "Olive", "Ivory"]
CRIME_TYPES = ["trespassing", "larceny", "vandalism", "assault", "fraud"]


def crimedesc_program() -> Program:
    return Program((parse_rule(CRIMEDESC, rule_id="crimedesc"),))


def witness_db(
    spark: SparkSession, n: int = 1400, seed: int = 0
) -> dict[str, DataFrame]:
    """``n`` controls the CRIME relation size (1.4K in the Artemis VM,
    scaled up to 22K in the paper); satellite tables scale with it."""
    g = np.random.default_rng(seed)
    # severity range grows with n so the CRIME relation actually scales
    # (CRIME(type, severity) is binary — a fixed range would saturate at
    # |types|·|range| distinct rows) and so the all-derivations space of
    # the Artemis baseline grows superlinearly with the dataset, which
    # is what produces its Fig. 12a blow-up/timeouts.
    sev_hi = 98 + max(2, n // 100)
    crime_pdf = pd.DataFrame(
        {
            "ctype": g.choice(CRIME_TYPES, n),
            "severity": g.integers(90, sev_hi, n),
        }
    ).drop_duplicates()
    n_w = max(20, n // 4)
    names = np.array([f"witness_{i}" for i in range(n_w)] + ["Aarongolden"])
    witness_pdf = pd.DataFrame(
        {
            "name": g.choice(names, n),
            "severity": g.integers(90, sev_hi, n),
        }
    ).drop_duplicates()
    # Aarongolden never witnesses severity > 97 → the question's answer is missing
    witness_pdf = witness_pdf[
        ~((witness_pdf["name"] == "Aarongolden") & (witness_pdf["severity"] > 97))
    ]
    witness_pdf = pd.concat(
        [witness_pdf, pd.DataFrame({"name": ["Aarongolden"], "severity": [95]})],
        ignore_index=True,
    ).drop_duplicates()
    saw_pdf = pd.DataFrame(
        {
            "name": g.choice(names, n),
            "hair": g.choice(HAIR, n),
            "cloth": g.choice(CLOTH, n),
        }
    ).drop_duplicates()
    n_p = max(20, n // 4)
    person_pdf = pd.DataFrame(
        {
            "pname": [f"person_{i}" for i in range(n_p)],
            "hair": g.choice(HAIR, n_p),
            "cloth": g.choice(CLOTH, n_p),
        }
    ).drop_duplicates()
    return {
        "CRIME": spark.createDataFrame(crime_pdf),
        "WITNESS": spark.createDataFrame(witness_pdf),
        "SAWPERSON": spark.createDataFrame(saw_pdf),
        "PERSON": spark.createDataFrame(person_pdf),
    }
