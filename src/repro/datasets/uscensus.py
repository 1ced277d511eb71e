"""USCensus stand-in (paper: 32,561 adult census records,
income-over-$50k task; errors: missing values + injected mislabels).

Mechanism: the missingness is **MNAR** — capital_gain and hours values
are blanked preferentially on the rows where they are highest (high
earners decline to answer). Mean/mode imputation therefore pulls
exactly the label-bearing cells toward the population average, which
is why the paper finds USCensus to be the one missing-value dataset
with clearly negative flags, while deletion merely shrinks the sample.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_missing

N = 1500
SEED = 1113


def generate_clean() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    age = rng.integers(17, 90, N).astype(float)
    education = rng.choice(
        ["hs", "some-college", "bachelors", "masters", "doctorate"],
        N,
        p=[0.35, 0.25, 0.25, 0.1, 0.05],
    )
    hours = np.clip(rng.normal(40, 11, N), 5, 99)
    capital_gain = np.where(rng.random(N) < 0.12, np.exp(rng.normal(8.2, 1.0, N)), 0.0)
    sex = rng.choice(["m", "f"], N)
    workclass = rng.choice(["private", "gov", "self"], N, p=[0.7, 0.15, 0.15])
    edu_eff = pd.Series(education).map(
        {"hs": -1.0, "some-college": -0.4, "bachelors": 0.6, "masters": 1.1, "doctorate": 1.6}
    ).to_numpy()
    z = (
        -1.1
        + edu_eff
        + 0.04 * (hours - 40)
        + 0.9 * (capital_gain > 0).astype(float)
        + 0.012 * (age - 40)
    )
    label = bernoulli_label(z, rng)
    return pd.DataFrame(
        {
            "age": age,
            "hours_per_week": np.round(hours, 0),
            "capital_gain": np.round(capital_gain, 0),
            "sex": sex,
            "education": education,
            "workclass": workclass,
            "income_gt_50k": label,
        }
    )


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED + 7)
    pdf = generate_clean()
    driver = pdf["capital_gain"].to_numpy() + 50.0 * pdf["hours_per_week"].to_numpy()
    return inject_missing(
        pdf, ["capital_gain", "hours_per_week"], 0.28, rng, mnar_driver=driver
    )


SPEC = DatasetSpec(
    name="USCensus",
    label="income_gt_50k",
    numeric=("age", "hours_per_week", "capital_gain"),
    categorical=("sex", "education", "workclass"),
    error_types=("missing_values", "mislabels"),
    generate=generate,
)
