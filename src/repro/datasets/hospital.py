"""Hospital length-of-stay data (running example of the paper).

Star schema on patient id ``pid`` (1:1 across the three tables, which
licenses ``fk_one_to_one`` joins and join elimination):

* ``patient_info``: pid, age, gender (0/1), pregnant (0/1), smoker
* ``blood_tests``: pid, bp, hematocrit, glucose
* ``prenatal_tests``: pid, trimester (0 if not pregnant), fetal_hr

The label ``los`` (length of stay, days) is a *pregnancy-branched*
piecewise function: for pregnant patients it depends on trimester/bp/
age; for non-pregnant on gender/glucose/smoker. A CART tree therefore
splits on ``pregnant`` near the root, which is exactly the shape the
paper's predicate-based pruning exploits (``pregnant=1`` kills the
other branch, after which ``gender`` is unused → projection pushdown).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

FEATURES = ["age", "gender", "pregnant", "smoker", "bp", "hematocrit", "glucose",
            "trimester", "fetal_hr"]


def tables(n: int = 10_000, seed: int = 0) -> dict[str, pd.DataFrame]:
    """Generate the three base tables, keyed 1:1 by ``pid``."""
    g = np.random.default_rng(seed)
    pid = np.arange(1, n + 1)
    gender = g.integers(0, 2, n)  # 1 = female
    age = g.integers(18, 95, n)
    pregnant = ((gender == 1) & (age <= 50) & (g.random(n) < 0.45)).astype(np.int64)
    smoker = g.integers(0, 2, n)
    patient_info = pd.DataFrame(
        {"pid": pid, "age": age.astype(np.int64), "gender": gender,
         "pregnant": pregnant, "smoker": smoker}
    )
    bp = np.round(g.normal(125, 18, n), 1)
    blood_tests = pd.DataFrame(
        {
            "pid": pid,
            "bp": bp,
            "hematocrit": np.round(g.normal(42, 5, n), 1),
            "glucose": np.round(g.normal(100, 25, n), 1),
        }
    )
    trimester = np.where(pregnant == 1, g.integers(1, 4, n), 0).astype(np.int64)
    fetal_hr = np.where(
        pregnant == 1, np.round(g.normal(140, 12, n), 1), 0.0
    )
    prenatal_tests = pd.DataFrame(
        {"pid": pid, "trimester": trimester, "fetal_hr": fetal_hr}
    )
    return {
        "patient_info": patient_info,
        "blood_tests": blood_tests,
        "prenatal_tests": prenatal_tests,
    }


def label_los(joined: pd.DataFrame, seed: int = 99) -> np.ndarray:
    """Length of stay in days: branches on pregnancy."""
    g = np.random.default_rng(seed)
    n = len(joined)
    preg = joined["pregnant"].to_numpy() == 1
    age = joined["age"].to_numpy(dtype=np.float64)
    bp = joined["bp"].to_numpy(dtype=np.float64)
    tri = joined["trimester"].to_numpy(dtype=np.float64)
    glu = joined["glucose"].to_numpy(dtype=np.float64)
    gender = joined["gender"].to_numpy(dtype=np.float64)
    smoker = joined["smoker"].to_numpy(dtype=np.float64)
    los = np.where(
        preg,
        # pregnant branch: a large base offset makes pregnancy the
        # dominant (root) split, as in the paper's running example;
        # third trimester + hypertension + age>35 keep patients longer
        6.0 + 3.0 * (tri >= 3) + 4.0 * (bp > 140) + 3.0 * (age > 35),
        # non-pregnant branch: gender matters only here (so pruning the
        # branch makes gender an unused feature → projection pushdown)
        1.0 + 2.5 * (glu > 130) + 1.5 * smoker + 1.0 * gender + 2.0 * (age > 70),
    )
    return np.round(np.clip(los + g.normal(0, 0.4, n), 0.0, None), 2)


def joined_frame(n: int = 10_000, seed: int = 0, with_label: bool = True) -> pd.DataFrame:
    """The 3-way join on pid (plus the ``los`` label for training)."""
    t = tables(n, seed)
    df = t["patient_info"].merge(t["blood_tests"], on="pid").merge(
        t["prenatal_tests"], on="pid"
    )
    if with_label:
        df["los"] = label_los(df, seed=seed + 99)
    return df


def spark_tables(spark, n: int = 10_000, seed: int = 0) -> dict:
    """The three base tables as Spark DataFrames."""
    return {k: spark.createDataFrame(v) for k, v in tables(n, seed).items()}
