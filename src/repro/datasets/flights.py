"""Flight-delay data (stand-in for the Kaggle flight-delays dataset).

Single wide table; categorical origin/dest/carrier columns expand into
wide one-hot blocks under the paper's featurization. The delay signal is
*planted sparsely*: only a handful of destination airports and carriers
actually move the delay probability, so L1-regularized logistic
regression zeroes most one-hot weights while keeping AUC — the setup
Fig. 2(a) needs (41.75% / 80.96% sparsity at high AUC).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

# the Kaggle dataset has ~630 airports; 100 keeps the one-hot blocks
# wide enough that dropping them dominates inference cost (the Fig. 2a
# mechanism) while staying train-able at our scale factors
N_AIRPORTS = 100
AIRPORTS = [f"A{i:02d}" for i in range(N_AIRPORTS)]
CARRIERS = ["AA", "AS", "B6", "DL", "F9", "NK", "UA", "WN"]

NUMERIC = ["distance", "dep_delay", "dep_hour", "day_of_week"]
CATEGORICAL = ["origin", "dest", "carrier"]

# planted effects: only these categories matter
_CONGESTED_DEST = {"A01": 1.2, "A05": 0.9, "A11": 1.5, "A17": 0.7}
_SLOW_CARRIERS = {"NK": 0.8, "F9": 0.6, "B6": 0.4}


def frame(n: int = 100_000, seed: int = 0, dest_skew: float = 0.0,
          n_airports: int = N_AIRPORTS) -> pd.DataFrame:
    """Generate ``n`` flights with a binary ``delayed`` label.

    ``dest_skew`` > 0 draws destinations from a Zipf-like distribution
    (rank^-skew), giving airports different selectivities — used by the
    T6 claim that categorical predicate-pruning speedup is independent
    of filter selectivity. ``n_airports`` widens/narrows the airport
    vocabulary (the Kaggle original has ~630; T2 uses a wide setting so
    one-hot width dominates inference cost as it does in the paper).
    """
    g = np.random.default_rng(seed)
    airports = [f"A{i:02d}" for i in range(n_airports)]
    origin = g.choice(airports, n)
    if dest_skew > 0:
        w = 1.0 / np.arange(1, n_airports + 1) ** dest_skew
        dest = g.choice(airports, n, p=w / w.sum())
    else:
        dest = g.choice(airports, n)
    carrier = g.choice(CARRIERS, n)
    dep_hour = g.integers(0, 24, n)
    day_of_week = g.integers(1, 8, n)
    distance = np.round(g.gamma(2.0, 400.0, n) + 100, 0)
    dep_delay = np.round(g.gamma(1.5, 8.0, n) - 5.0, 1)

    score = (
        0.10 * dep_delay
        + 0.04 * (dep_hour - 12)
        + np.vectorize(lambda d: _CONGESTED_DEST.get(d, 0.0))(dest)
        + np.vectorize(lambda c: _SLOW_CARRIERS.get(c, 0.0))(carrier)
        - 1.2
    )
    p = 1.0 / (1.0 + np.exp(-score))
    delayed = (g.random(n) < p).astype(np.int64)
    return pd.DataFrame(
        {
            "flight_id": np.arange(1, n + 1),
            "origin": origin,
            "dest": dest,
            "carrier": carrier,
            "dep_hour": dep_hour.astype(np.int64),
            "day_of_week": day_of_week.astype(np.int64),
            "distance": distance,
            "dep_delay": dep_delay,
            "delayed": delayed,
        }
    )


def spark_frame(spark, n: int = 100_000, seed: int = 0):
    return spark.createDataFrame(frame(n, seed))
