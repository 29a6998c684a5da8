"""Table 5 — per-image annotation time, baseline UI vs SeeSaw UI.

The paper measures this with 40 human users (20 grad students, 20 MTurk
workers). Humans are unavailable here, so per DESIGN.md §2 we simulate the
*measurement pipeline* over a stochastic user model: each simulated user has
a per-user speed factor; each displayed image draws an annotation time from
the model's action components (inspect, mark-relevant keystroke, box draw).
The component means are taken from the paper's reported values (they are
the model's priors — this table validates the harness and the CI math, not
an independent measurement; EXPERIMENTS.md says so explicitly).

The aggregation (grouping into the 2x2 of system x marked, mean and
bootstrap 95% CI) runs as a Spark job over the simulated event log.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

# Annotation-time model components (seconds). Inspect ~ time to look at an
# image and decide; mark ~ the keystroke/flag on a relevant image; box ~
# drawing the region rectangle (SeeSaw only); seesaw_ui ~ extra UI latency
# per image in the feedback-enabled interface.
INSPECT_S = 1.98
MARK_S = 1.02
BOX_S = 1.40
SEESAW_UI_S = 0.42


def simulate_events(
    *,
    n_users: int = 40,
    images_per_user: int = 60,
    p_relevant: float = 0.25,
    seed: int = 0,
) -> pd.DataFrame:
    """Simulated annotation event log: one row per (user, image) action.

    Each user annotates ``images_per_user`` images on each system;
    ``p_relevant`` of them are relevant and get marked. Per-user lognormal
    speed factor plus per-event gamma noise produce realistic dispersion.
    """
    g = np.random.default_rng(seed)
    rows = []
    for user in range(n_users):
        speed = g.lognormal(mean=0.0, sigma=0.18)
        for system in ("baseline", "seesaw"):
            marked = g.random(images_per_user) < p_relevant
            for img, m in enumerate(marked):
                t = INSPECT_S
                if system == "seesaw":
                    t += SEESAW_UI_S
                if m:
                    t += MARK_S
                    if system == "seesaw":
                        t += BOX_S
                t = t * speed * g.gamma(shape=25.0, scale=1 / 25.0)
                rows.append((user, system, bool(m), float(t)))
    return pd.DataFrame(rows, columns=["user", "system", "marked", "seconds"])


def table5(spark: SparkSession, *, n_users: int = 40, seed: int = 0) -> pd.DataFrame:
    """Mean annotation seconds ± bootstrap 95% CI per (system, marked) cell.

    The mean/stderr aggregation is a Spark groupBy; the CI uses the normal
    approximation of the bootstrap (the paper's error bars are bootstrap
    CIs of the mean — at these sample sizes the two agree to the cent).
    """
    events = simulate_events(n_users=n_users, seed=seed)
    df = spark.createDataFrame(events)
    agg = (
        df.groupBy("system", "marked")
        .agg(
            F.mean("seconds").alias("mean_s"),
            (1.96 * F.stddev("seconds") / F.sqrt(F.count("*"))).alias("ci95"),
            F.count("*").alias("n"),
        )
        .orderBy("system", "marked")
        .toPandas()
    )
    agg["label"] = np.where(agg["marked"], "marked relevant", "not marked")
    return agg[["system", "label", "mean_s", "ci95", "n"]]
