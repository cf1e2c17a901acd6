"""Synthetic Chicago-crimes dataset for queries r5 (CommCrime) and
r6 (CrimeSince) of Fig. 4.

Schema: CRIMES(id, year, ctype, loc, community) + ARREST(id).
The crime type 'ritualism' exists in the type domain but only occurs
with arrests, making it a missing CrimeSince answer (the Fig. 5 why-not
binding).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.ast import Program, parse_rule

CRIME_TYPES = [
    "theft", "battery", "assault", "burglary", "robbery", "fraud",
    "narcotics", "vandalism", "trespass", "arson", "homicide",
    "kidnapping", "stalking", "gambling", "ritualism",
]
COMMUNITIES = ["austin", "loop", "uptown", "pilsen", "hyde park",
               "englewood", "edgewater", "avondale"]

R5_CRIMES = "CommCrime(T) :- CRIMES(I, Y, T, L, 'austin'), not ARREST(I)."
R6_CRIMES = "CrimeSince(T) :- CRIMES(I, Y, T, L, C), not ARREST(I), Y > 2012."


def r5_program() -> Program:
    return Program((parse_rule(R5_CRIMES, rule_id="r5"),))


def r6_program() -> Program:
    return Program((parse_rule(R6_CRIMES, rule_id="r6"),))


def crimes(
    spark: SparkSession, n: int = 10_000, seed: int = 0
) -> dict[str, DataFrame]:
    g = np.random.default_rng(seed)
    ctype = g.choice(CRIME_TYPES, n)
    crimes_pdf = pd.DataFrame(
        {
            "id": np.arange(1, n + 1),
            "year": g.integers(2001, 2024, n),
            "ctype": ctype,
            "loc": [f"block_{i}" for i in g.integers(0, max(10, n // 20), n)],
            "community": g.choice(COMMUNITIES, n),
        }
    )
    arrest_mask = g.random(n) < 0.3
    arrest_mask |= ctype == "ritualism"  # always arrested → missing answer
    arrest_pdf = pd.DataFrame({"id": crimes_pdf.loc[arrest_mask, "id"]})
    return {
        "CRIMES": spark.createDataFrame(crimes_pdf),
        "ARREST": spark.createDataFrame(arrest_pdf),
    }
