"""Credit stand-in (paper: 150,000 records, financial-distress task,
6.7 % minority class, F1 metric; errors: missing values and numerical
outliers).

Mechanism: the key property is that the numeric "outliers" are genuine
heavy-tail signal — extreme revolving utilization and late-payment
counts are exactly what predicts distress — so SD/IQR/IF cleaning
erases minority-class evidence (the paper's negative flags concentrate
here). Missingness on monthly_income is MCAR.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_missing

N = 1500
SEED = 1104


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    age = rng.integers(21, 85, N).astype(float)
    monthly_income = np.round(np.exp(rng.normal(8.4, 0.6, N)), 2)
    revolving_util = np.exp(rng.normal(-1.2, 1.1, N))  # heavy right tail
    num_late = rng.poisson(0.3, N) + (rng.random(N) < 0.05) * rng.poisson(8, N)
    debt_ratio = np.exp(rng.normal(-1.0, 0.9, N))
    num_dependents = rng.integers(0, 5, N).astype(float)
    z = (
        -4.2
        + 1.4 * np.log1p(revolving_util)
        + 0.55 * num_late
        + 0.5 * np.log1p(debt_ratio)
        - 0.015 * (age - 45)
        - 0.3 * (np.log(monthly_income) - 8.4)
    )
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "age": age,
            "monthly_income": monthly_income,
            "revolving_util": np.round(revolving_util, 4),
            "num_late": num_late.astype(float),
            "debt_ratio": np.round(debt_ratio, 4),
            "num_dependents": num_dependents,
            "distress": label,
        }
    )
    return inject_missing(pdf, ["monthly_income", "num_dependents"], 0.15, rng)


SPEC = DatasetSpec(
    name="Credit",
    label="distress",
    numeric=(
        "age",
        "monthly_income",
        "revolving_util",
        "num_late",
        "debt_ratio",
        "num_dependents",
    ),
    error_types=("missing_values", "outliers"),
    imbalanced=True,
    generate=generate,
)
