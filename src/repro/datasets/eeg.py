"""EEG stand-in (paper: 14,980 recordings, 14 channels, eye-state
task; errors: numerical outliers + injected mislabels).

Mechanism: channels share a latent eye-state signal with per-channel
gains; ~3 % of cells are corrupted with huge sensor spikes (the real
EEG dataset's documented transmission glitches). Spike removal restores
the signal, so outlier cleaning is strongly positive here and KNN —
whose distances the spikes dominate — benefits the most, matching the
paper's Q3/Q5 results.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, inject_gross_outliers

N = 1200
SEED = 1105
CHANNELS = [f"ch{i}" for i in range(1, 15)]


def generate_clean() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    state = rng.integers(0, 2, N)
    gains = rng.normal(1.0, 0.3, len(CHANNELS))
    base = rng.normal(4300, 30, (N, len(CHANNELS)))
    signal = (2 * state - 1)[:, None] * gains[None, :] * 18.0
    X = base + signal + rng.normal(0, 12, (N, len(CHANNELS)))
    pdf = pd.DataFrame(np.round(X, 2), columns=CHANNELS)
    pdf["eye_open"] = state
    return pdf


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED + 7)
    return inject_gross_outliers(generate_clean(), CHANNELS[:6], 0.03, rng, scale=40)


SPEC = DatasetSpec(
    name="EEG",
    label="eye_open",
    numeric=tuple(CHANNELS),
    error_types=("outliers", "mislabels"),
    generate=generate,
)
