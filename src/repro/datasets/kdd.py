"""KDD stand-in (paper: 131,329 DonorsChoose project records,
is-the-project-"exciting" task, 11 % minority class, F1 metric;
errors: missing values, numerical outliers, injected mislabels).

Mechanism: like Credit, funding totals are genuinely heavy-tailed and
informative, so outlier cleaning removes minority-class signal (the
paper's N flags). Missingness is MCAR on an informative column at a
high rate, so deletion discards a third of the data and imputation
wins — the paper found *all* KDD missing-value flags positive.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_missing

N = 1500
SEED = 1106


def generate_clean() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    total_price = np.exp(rng.normal(6.0, 0.9, N))  # heavy tail, informative
    num_donors = rng.poisson(8, N).astype(float)
    teacher_referred = rng.integers(0, 2, N).astype(float)
    poverty = rng.choice(["high", "highest", "moderate", "low"], N)
    subject = rng.choice(["math", "literacy", "music", "science"], N)
    students = rng.integers(10, 300, N).astype(float)
    z = (
        -3.9
        + 1.5 * (np.log(total_price) - 6.0)
        + 0.28 * (num_donors - 8)
        + 1.2 * teacher_referred
        + np.where(pd.Series(poverty).isin(["high", "highest"]), 0.6, -0.3)
    )
    label = bernoulli_label(z, rng)
    return pd.DataFrame(
        {
            "total_price": np.round(total_price, 2),
            "num_donors": num_donors,
            "teacher_referred": teacher_referred,
            "students_reached": students,
            "poverty_level": poverty,
            "subject": subject,
            "is_exciting": label,
        }
    )


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED + 7)
    # 40% missingness on two columns: deletion discards ~60% of the
    # rows of an already minority-starved task, which is why the paper
    # finds every KDD missing-value flag positive for imputation.
    return inject_missing(
        generate_clean(), ["num_donors", "students_reached"], 0.40, rng
    )


SPEC = DatasetSpec(
    name="KDD",
    label="is_exciting",
    numeric=("total_price", "num_donors", "teacher_referred", "students_reached"),
    categorical=("poverty_level", "subject"),
    error_types=("missing_values", "outliers", "mislabels"),
    imbalanced=True,
    generate=generate,
)
