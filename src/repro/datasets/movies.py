"""Synthetic movie dataset for queries r3, r4 (union), r11, r12 of Fig. 4.

Schema (arities match the rules):
  MOVIES(id, title, year, runtime, popularity, budget, votes)
  GENRES(id, genre)           PRODCOMPANY(id, cid)    COMPANY(cid, name)
  RATINGS(user, id, rating, ts)
  CASTS(id, castid, character, actor, gender)
  CREWS(id, crewid, name, job, dept)
  KEYWORDS(id, keyword)

'tom cruise' and 'jack black' appear as actors; 'tom ford' never does
(the r4 why-not binding of Fig. 5); the genre 'family' is never assigned
(the r3 why-not binding); keyword 'spying' is never assigned (the r12
why-not binding).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.ast import Program, parse_rule

GENRE_POOL = [
    "drama", "comedy", "romance", "action", "thriller",
    "horror", "scifi", "documentary", "animation",
]
KEYWORD_POOL = [
    "love", "relationship", "mission", "war", "space",
    "heist", "revenge", "friendship", "magic", "sports",
]

R3_MOVIES = (
    "CasualWatch(T, E, N) :- MOVIES(I, T, Y, R, P, B, V), GENRES(I, E), "
    "PRODCOMPANY(I, C), COMPANY(C, N), RATINGS(U, I, G, S), "
    "not GENRES(I, 'thriller'), R < 100, G >= 4."
)
R4A = (
    "Players(A) :- MOVIES(I, T, Y, R, P, B, V), CASTS(I, C, H, A, G), "
    "GENRES(I, 'romance'), RATINGS(U, I, N, S), Y > 1999, N >= 4."
)
R4B = (
    "Players(A) :- MOVIES(I, T, Y, R, P, B, V), CASTS(I, C, H, A, G), "
    "GENRES(I, 'comedy'), KEYWORDS(I, 'love'), "
    "RATINGS(U, I, N, S), Y > 1999, N >= 4."
)
R4C = (
    "Players(A) :- MOVIES(I, T, Y, R, P, B, V), CASTS(I, C, H, A, G), "
    "GENRES(I, 'drama'), KEYWORDS(I, 'relationship'), "
    "RATINGS(U, I, N, S), Y > 1999, N >= 4."
)
R11_MOVIES = (
    "DirGen(N) :- MOVIES(I, T, Y, R, P, B, V), "
    "CREWS(I, W, N, 'director', M), GENRES(I, E), B > 20000000."
)
R12_MOVIES = (
    "TomKey(T, K, E) :- MOVIES(I, T, Y, R, P, B, V), "
    "CASTS(I, C, H, 'tom cruise', G), KEYWORDS(I, K), "
    "GENRES(I, E), RATINGS(U, I, A, S), A >= 4."
)


def r3_program() -> Program:
    return Program((parse_rule(R3_MOVIES, rule_id="r3"),))


def r4_program() -> Program:
    return Program(
        (
            parse_rule(R4A, rule_id="r4"),
            parse_rule(R4B, rule_id="r4b"),
            parse_rule(R4C, rule_id="r4c"),
        )
    )


def r11_program() -> Program:
    return Program((parse_rule(R11_MOVIES, rule_id="r11"),))


def r12_program() -> Program:
    return Program((parse_rule(R12_MOVIES, rule_id="r12"),))


def movies(
    spark: SparkSession, n_movies: int = 2000, seed: int = 0
) -> dict[str, DataFrame]:
    """Generate the movie database; row counts of the satellite tables
    are small multiples of ``n_movies`` (as in the Kaggle original)."""
    g = np.random.default_rng(seed)
    n = n_movies
    ids = np.arange(1, n + 1)
    movies_pdf = pd.DataFrame(
        {
            "id": ids,
            "title": [f"movie_{i}" for i in ids],
            "year": g.integers(1980, 2021, n),
            "runtime": g.integers(60, 181, n),
            "popularity": (g.random(n) * 100).round(1),
            "budget": g.integers(0, 300, n) * 1_000_000,
            "votes": g.integers(0, 10_000, n),
        }
    )
    # 1-2 genres per movie ('family' deliberately never assigned)
    gn = np.concatenate([ids, ids[g.random(n) < 0.6]])
    genres_pdf = pd.DataFrame(
        {"id": gn, "genre": g.choice(GENRE_POOL, len(gn))}
    ).drop_duplicates()
    n_comp = max(5, n // 50)
    company_pdf = pd.DataFrame(
        {"cid": np.arange(1, n_comp + 1),
         "name": [f"studio_{i}" for i in range(1, n_comp + 1)]}
    )
    prod_pdf = pd.DataFrame({"id": ids, "cid": g.integers(1, n_comp + 1, n)})
    n_rat = n * 3
    ratings_pdf = pd.DataFrame(
        {
            "userid": g.integers(1, max(2, n // 2), n_rat),
            "id": g.integers(1, n + 1, n_rat),
            "rating": g.integers(1, 6, n_rat),
            "ts": g.integers(1_000_000, 2_000_000, n_rat),
        }
    ).drop_duplicates(subset=["userid", "id"])
    actors = np.array(
        [f"actor_{i}" for i in range(max(10, n // 10))] + ["tom cruise", "jack black"]
    )
    n_cast = n * 3
    casts_pdf = pd.DataFrame(
        {
            "id": g.integers(1, n + 1, n_cast),
            "castid": np.arange(1, n_cast + 1),
            "character": [f"char_{i}" for i in range(n_cast)],
            "actor": g.choice(actors, n_cast),
            "gender": g.integers(0, 3, n_cast),
        }
    )
    crew_names = np.array([f"crew_{i}" for i in range(max(10, n // 10))])
    n_crew = n * 2
    crews_pdf = pd.DataFrame(
        {
            "id": g.integers(1, n + 1, n_crew),
            "crewid": np.arange(1, n_crew + 1),
            "name": g.choice(crew_names, n_crew),
            "job": g.choice(["director", "writer", "producer"], n_crew),
            "dept": g.choice(["directing", "writing", "production"], n_crew),
        }
    )
    kw = np.concatenate([ids[g.random(n) < 0.8], ids[g.random(n) < 0.3]])
    keywords_pdf = pd.DataFrame(
        {"id": kw, "keyword": g.choice(KEYWORD_POOL, len(kw))}
    ).drop_duplicates()

    # Deterministic anchor movie guaranteeing the Fig. 5 "why" bindings
    # exist at every scale: a post-1999, short, high-budget, 5-star
    # romance/comedy/drama with jack black and tom cruise, keywords
    # love/relationship/mission, directed by crew_0.
    aid = n + 1
    movies_pdf = pd.concat(
        [movies_pdf, pd.DataFrame([{
            "id": aid, "title": "movie_anchor", "year": 2005, "runtime": 90,
            "popularity": 50.0, "budget": 50_000_000, "votes": 5000,
        }])], ignore_index=True)
    genres_pdf = pd.concat(
        [genres_pdf, pd.DataFrame({"id": [aid] * 3,
                                   "genre": ["romance", "comedy", "drama"]})],
        ignore_index=True).drop_duplicates()
    prod_pdf = pd.concat(
        [prod_pdf, pd.DataFrame([{"id": aid, "cid": 1}])], ignore_index=True)
    ratings_pdf = pd.concat(
        [ratings_pdf, pd.DataFrame([{"userid": 1, "id": aid, "rating": 5,
                                     "ts": 1_500_000}])], ignore_index=True)
    casts_pdf = pd.concat(
        [casts_pdf, pd.DataFrame([
            {"id": aid, "castid": n_cast + 1, "character": "lead",
             "actor": "jack black", "gender": 2},
            {"id": aid, "castid": n_cast + 2, "character": "support",
             "actor": "tom cruise", "gender": 2},
        ])], ignore_index=True)
    crews_pdf = pd.concat(
        [crews_pdf, pd.DataFrame([{"id": aid, "crewid": n_crew + 1,
                                   "name": "crew_0", "job": "director",
                                   "dept": "directing"}])], ignore_index=True)
    keywords_pdf = pd.concat(
        [keywords_pdf, pd.DataFrame({"id": [aid] * 3,
                                     "keyword": ["love", "relationship",
                                                 "mission"]})],
        ignore_index=True).drop_duplicates()
    return {
        "MOVIES": spark.createDataFrame(movies_pdf),
        "GENRES": spark.createDataFrame(genres_pdf),
        "PRODCOMPANY": spark.createDataFrame(prod_pdf),
        "COMPANY": spark.createDataFrame(company_pdf),
        "RATINGS": spark.createDataFrame(ratings_pdf),
        "CASTS": spark.createDataFrame(casts_pdf),
        "CREWS": spark.createDataFrame(crews_pdf),
        "KEYWORDS": spark.createDataFrame(keywords_pdf),
    }
