"""Titanic stand-in (paper: 891 passengers, survival task; error: a
significant number of missing values, mostly in age).

Mechanism: the classic survival structure (sex, class, fare, age) with
~20 % of ages and some embarkation ports missing at random, like the
real manifest.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_missing

N = 600
SEED = 1111


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    pclass = rng.choice(["1", "2", "3"], N, p=[0.25, 0.2, 0.55])
    sex = rng.choice(["male", "female"], N, p=[0.65, 0.35])
    age = np.clip(rng.normal(30, 13, N), 1, 80)
    sibsp = rng.poisson(0.5, N).astype(float)
    fare = np.round(
        np.exp(rng.normal(2.8, 0.8, N))
        * pd.Series(pclass).map({"1": 3.0, "2": 1.5, "3": 1.0}).to_numpy(),
        2,
    )
    z = (
        2.4 * (sex == "female").astype(float)
        - 1.2
        + pd.Series(pclass).map({"1": 1.0, "2": 0.2, "3": -0.7}).to_numpy()
        - 0.02 * (age - 30)
        - 0.2 * sibsp
    )
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "pclass": pclass,
            "sex": sex,
            "age": np.round(age, 1),
            "sibsp": sibsp,
            "fare": fare,
            "embarked": rng.choice(["S", "C", "Q"], N, p=[0.7, 0.2, 0.1]),
            "survived": label,
        }
    )
    pdf = inject_missing(pdf, ["age"], 0.30, rng)
    return inject_missing(pdf, ["embarked", "fare"], 0.03, rng)


SPEC = DatasetSpec(
    name="Titanic",
    label="survived",
    numeric=("age", "sibsp", "fare"),
    categorical=("pclass", "sex", "embarked"),
    error_types=("missing_values",),
    generate=generate,
)
