"""Marketing stand-in (paper: 8,993 household survey records,
income-under-$25k task; error: missing values).

Mechanism: income depends on education, occupation and age; survey
non-response (MCAR) blanks demographic answers at a moderate rate, so
imputation and deletion mostly tie — the paper finds predominantly
insignificant flags here.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_missing

N = 1000
SEED = 1107


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    age = rng.integers(18, 80, N).astype(float)
    education = rng.choice(["none", "highschool", "college", "graduate"], N, p=[0.1, 0.4, 0.35, 0.15])
    occupation = rng.choice(["manual", "clerical", "professional", "retired", "student"], N)
    household_size = rng.integers(1, 7, N).astype(float)
    sex = rng.choice(["m", "f"], N)
    edu_eff = pd.Series(education).map(
        {"none": 1.2, "highschool": 0.5, "college": -0.6, "graduate": -1.4}
    ).to_numpy()
    occ_eff = pd.Series(occupation).map(
        {"manual": 0.5, "clerical": 0.0, "professional": -1.0, "retired": 0.6, "student": 1.0}
    ).to_numpy()
    z = edu_eff + occ_eff - 0.01 * (age - 45) + 0.1 * (household_size - 3)
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "age": age,
            "household_size": household_size,
            "sex": sex,
            "education": education,
            "occupation": occupation,
            "under_25k": label,
        }
    )
    return inject_missing(pdf, ["age", "education", "occupation"], 0.10, rng)


SPEC = DatasetSpec(
    name="Marketing",
    label="under_25k",
    numeric=("age", "household_size"),
    categorical=("sex", "education", "occupation"),
    error_types=("missing_values",),
    generate=generate,
)
