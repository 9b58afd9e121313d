"""T8 — static-analysis latency (§3.2 inline claim).

The paper: "In most practical cases we tested, static analysis takes
less than 10 msec." We analyze a small corpus of representative
pipeline scripts (joins, filters, projections, predicts, conditionals,
UDF fallbacks) many times and report per-script median latency.
"""
from __future__ import annotations

import numpy as np

from repro.analyzer import analyze_script
from repro.datasets import hospital
from repro.experiments.common import hospital_tree_pipeline
from repro.ir import Catalog

SCRIPTS = {
    "join2_filter_predict": """
df = patient_info.merge(blood_tests, on="pid")
df = df[df["pregnant"] == 1]
pred = los_model.predict(df)
""",
    "join3_predict": """
df = patient_info.merge(blood_tests, on="pid")
df = df.merge(prenatal_tests, on="pid")
pred = los_model.predict(df)
""",
    "project_then_predict": """
df = patient_info.merge(blood_tests, on="pid")
X = df[["age", "bp", "pregnant"]]
pred = los_model.predict(df)
""",
    "conditional_two_paths": """
flag = True
if flag:
    df = patient_info[patient_info["age"] > 40]
else:
    df = patient_info
pred = los_model.predict(df)
""",
    "udf_fallback_loop": """
df = patient_info[patient_info["age"] > 40]
for i in range(2):
    df = df
pred = los_model.predict(df)
""",
    "udf_fallback_unknown_call": """
df = patient_info.merge(blood_tests, on="pid")
df2 = df.assign(bp2=df["bp"] * 2)
pred = los_model.predict(df2)
""",
}


def run(reps: int = 30, n_train: int = 5_000, seed: int = 0) -> list[dict]:
    catalog = (
        Catalog()
        .add_table("patient_info", ["pid", "age", "gender", "pregnant", "smoker"], {"pid"})
        .add_table("blood_tests", ["pid", "bp", "hematocrit", "glucose"], {"pid"})
        .add_table("prenatal_tests", ["pid", "trimester", "fetal_hr"], {"pid"})
    )
    models = {"los_model": (hospital_tree_pipeline(n_train=n_train, seed=seed), "label")}
    rows = []
    for name, script in SCRIPTS.items():
        times, res = [], None
        for _ in range(reps):
            res = analyze_script(script, catalog, models, result_var="pred")
            times.append(res.elapsed_ms)
        rows.append(
            {
                "script": name,
                "plans": len(res.plans),
                "udf_fallbacks": res.udf_count,
                "median_ms": float(np.median(times)),
                "p95_ms": float(np.percentile(times, 95)),
                "under_10ms": bool(np.median(times) < 10.0),
            }
        )
    return rows
