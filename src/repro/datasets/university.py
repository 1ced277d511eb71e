"""University stand-in (paper: 286 universities, expenses-over-$7k
task; error: inconsistent state and location strings).

Mechanism: expenses follow control (private/public), SAT scores and
state cost levels; state names appear as full names, postal codes and
abbreviations — the paper's inconsistency pattern.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, bernoulli_label, inject_inconsistency

N = 286
SEED = 1112

_STATE_VARIANTS = {
    "california": "California.",
    "new york": "New-York",
    "texas": "TEXAS ",
    "massachusetts": "Massachusetts!",
}
_LOC_VARIANTS = {"urban": "Urban.", "suburban": "SUBURBAN"}


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    state = rng.choice(
        ["california", "new york", "texas", "massachusetts", "ohio", "georgia"], N
    )
    control = rng.choice(["private", "public"], N, p=[0.45, 0.55])
    location = rng.choice(["urban", "suburban", "rural"], N)
    sat_verbal = np.clip(rng.normal(520, 60, N), 350, 750)
    sat_math = np.clip(rng.normal(540, 65, N), 350, 780)
    enrollment = np.round(np.exp(rng.normal(8.3, 0.9, N)), 0)
    z = (
        1.8 * (control == "private").astype(float)
        - 0.9
        + 0.012 * (sat_math - 540)
        + pd.Series(state).map(
            {
                "california": 0.4,
                "new york": 0.6,
                "texas": -0.4,
                "massachusetts": 0.7,
                "ohio": -0.3,
                "georgia": -0.4,
            }
        ).to_numpy()
    )
    label = bernoulli_label(z, rng)
    pdf = pd.DataFrame(
        {
            "state": state,
            "control": control,
            "location": location,
            "sat_verbal": np.round(sat_verbal, 0),
            "sat_math": np.round(sat_math, 0),
            "enrollment": enrollment,
            "expenses_gt_7k": label,
        }
    )
    pdf = inject_inconsistency(pdf, "state", _STATE_VARIANTS, 0.35, rng)
    return inject_inconsistency(pdf, "location", _LOC_VARIANTS, 0.25, rng)


SPEC = DatasetSpec(
    name="University",
    label="expenses_gt_7k",
    numeric=("sat_verbal", "sat_math", "enrollment"),
    categorical=("state", "control", "location"),
    error_types=("inconsistencies",),
    inconsistent_cols=("state", "location"),
    generate=generate,
)
