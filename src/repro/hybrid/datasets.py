"""Synthetic stand-ins for the paper's Twitter (16 GB JSON) and MIMIC-III
(46.6 GB) datasets, scaled to single-node size.

Twitter-like schema roles (paper §2, §9.2.2):
  user(u_id, 6 numeric features)                 - PK side
  tweet(t_id, u_id, 6 numeric features,
        country, keyword, row_id)                - FK side; ``row_id`` is
        the dense row index among tweets matching (country='US', keyword),
        mirroring the paper's matrix construction for the filtered tweets
  tweet_hashtag(t_id, h_id, filter_level)        - ultra-sparse incidence

MIMIC-like reuses the same generator with renamed roles (patients /
admissions / services), as the paper's two benchmarks exercise identical
matrix shapes (dense PK-FK join M, ultra-sparse incidence N).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

KEYWORDS = ("covid", "trump", "election", "other")
COUNTRIES = ("US", "FR", "IN", "BR")


@dataclass
class HybridTables:
    user: DataFrame
    tweet: DataFrame
    tweet_hashtag: DataFrame
    n_rows: int        # tweets matching the (country, keyword) filter
    n_users: int
    n_hashtags: int
    keyword: str


def twitter_like(spark: SparkSession, *, n_tweets: int = 12000,
                 n_users: int = 500, n_hashtags: int = 150,
                 keyword: str = "covid", seed: int = 7) -> HybridTables:
    """Generate the three tables; ~1/3 of tweets match country='US' and the
    chosen keyword (the paper varies this selectivity in Fig. 10)."""
    g = np.random.default_rng(seed)
    users = pd.DataFrame({"u_id": np.arange(n_users)})
    for i in range(6):
        users[f"uf{i}"] = g.random(n_users).round(4)

    tweets = pd.DataFrame({
        "t_id": np.arange(n_tweets),
        "u_id": g.integers(0, n_users, n_tweets),
        "country": g.choice(COUNTRIES, n_tweets, p=[0.55, 0.15, 0.15, 0.15]),
        "keyword": g.choice(KEYWORDS, n_tweets, p=[0.55, 0.2, 0.15, 0.1]),
    })
    for i in range(6):
        tweets[f"tf{i}"] = g.random(n_tweets).round(4)
    sel = (tweets["country"] == "US") & (tweets["keyword"] == keyword)
    tweets["row_id"] = np.where(sel, sel.cumsum() - 1, -1).astype("int64")
    n_rows = int(sel.sum())

    # ~3 hashtags per tweet, filter_level 1..5 skewed low
    per = 3
    th = pd.DataFrame({
        "t_id": np.repeat(tweets["t_id"].to_numpy(), per),
        "h_id": g.integers(0, n_hashtags, n_tweets * per),
        "filter_level": g.choice([1, 2, 3, 4, 5], n_tweets * per,
                                 p=[0.35, 0.25, 0.2, 0.12, 0.08]),
    }).drop_duplicates(["t_id", "h_id"])

    return HybridTables(
        user=spark.createDataFrame(users).cache(),
        tweet=spark.createDataFrame(tweets).cache(),
        tweet_hashtag=spark.createDataFrame(th).cache(),
        n_rows=n_rows, n_users=n_users, n_hashtags=n_hashtags, keyword=keyword)


def mimic_like(spark: SparkSession, *, n_admissions: int = 8000,
               n_patients: int = 400, n_services: int = 120,
               care_unit: str = "CCU", seed: int = 11) -> HybridTables:
    """MIMIC-like: admissions x patients PK-FK join (dense M) and an
    admission x service outcome matrix (ultra-sparse N). Reuses the
    twitter generator; the care unit plays the paper's role of shrinking
    N (CCU -> TSICU -> MICU halves the row count, §9.2.2 Fig. 11)."""
    scale = {"CCU": 1.0, "TSICU": 0.5, "MICU": 0.25}[care_unit]
    return twitter_like(spark, n_tweets=max(200, int(n_admissions * scale)),
                        n_users=n_patients, n_hashtags=n_services,
                        keyword="covid", seed=seed)
