"""The Seattle Airbnb example of Fig. 1 (S-Airbnb) and a scalable
surrogate for the full dataset (F-Airbnb).

S-Airbnb is the exact 6-listing/4-availability instance of the paper;
with the default active-domain semantics it yields exactly 2160
derivations for the question Whynot AL(N, shared) — the number quoted in
Sec. 1 (6·6·3·5·4, R bound to 'shared').
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.ast import Program, parse_rule

#: Rule r1 of Fig. 1 (dates as strings).
R1_AIRBNB = (
    "AL(N, R) :- LISTING(I, N, T, R, 'queen anne', E), "
    "AVAILABILITY(I, '2016-11-09', P)."
)


def airbnb_program() -> Program:
    return Program((parse_rule(R1_AIRBNB, rule_id="r1"),))


def s_airbnb(spark: SparkSession) -> dict[str, DataFrame]:
    """The exact sample instance of Fig. 1."""
    listing = pd.DataFrame(
        [
            (8403, "central place", "apt", "shared", "queen anne", "east"),
            (9211, "plum", "apt", "entire", "ballard", "adams"),
            (2445, "cozy homebase", "house", "private", "queen anne", "west"),
            (8575, "near SpaceNeedle", "apt", "shared", "queen anne", "lower"),
            (4947, "seattle couch", "condo", "shared", "downtown", "first hill"),
            (2332, "modern view", "house", "entire", "queen anne", "west"),
        ],
        columns=["id", "name", "ptype", "rtype", "ngroup", "neighbor"],
    )
    availability = pd.DataFrame(
        [
            (9211, "2016-11-09", 130),
            (2445, "2016-11-09", 45),
            (2332, "2016-11-09", 350),
            (4947, "2016-11-10", 40),
        ],
        columns=["id", "date", "price"],
    )
    return {
        "LISTING": spark.createDataFrame(listing),
        "AVAILABILITY": spark.createDataFrame(availability),
    }


def f_airbnb(
    spark: SparkSession, n_listings: int = 2000, seed: int = 0
) -> dict[str, DataFrame]:
    """Scalable surrogate for the full Seattle dataset: same schema and
    categorical structure, sizes controlled by ``n_listings``."""
    g = np.random.default_rng(seed)
    n = n_listings
    ngroups = ["queen anne", "ballard", "downtown", "capitol hill", "fremont"]
    neighbors = [f"nb_{i}" for i in range(20)]
    listing = pd.DataFrame(
        {
            "id": np.arange(1, n + 1),
            "name": [f"listing_{i}" for i in range(1, n + 1)],
            "ptype": g.choice(["apt", "house", "condo"], n, p=[0.6, 0.3, 0.1]),
            "rtype": g.choice(["entire", "private", "shared"], n, p=[0.6, 0.3, 0.1]),
            "ngroup": g.choice(ngroups, n),
            "neighbor": g.choice(neighbors, n),
        }
    )
    # ~40% of listings have an availability row on the query date; shared
    # rooms in queen anne are deliberately left unavailable on that date
    # so the paper's question AL(N, shared) has missing answers.
    avail_mask = g.random(n) < 0.4
    shared_qa = (listing["rtype"] == "shared") & (listing["ngroup"] == "queen anne")
    avail_mask &= ~shared_qa.to_numpy()
    ids = listing.loc[avail_mask, "id"].to_numpy()
    availability = pd.DataFrame(
        {
            "id": ids,
            "date": g.choice(["2016-11-09", "2016-11-10"], len(ids), p=[0.7, 0.3]),
            "price": g.integers(30, 400, len(ids)),
        }
    )
    return {
        "LISTING": spark.createDataFrame(listing),
        "AVAILABILITY": spark.createDataFrame(availability),
    }
