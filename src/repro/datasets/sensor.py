"""Sensor stand-in (paper: 62,076 Intel-lab readings from two motes,
which-sensor task; error: numerical outliers).

Mechanism: the two motes have slightly shifted temperature / humidity
/ light baselines; failing batteries produce gross voltage/temperature
spikes (the documented pathology of the real Intel-lab data), so
outlier cleaning restores separability — the paper finds mostly
positive flags here.
"""
import numpy as np
import pandas as pd

from repro.datasets.base import DatasetSpec, inject_gross_outliers

N = 1200
SEED = 1110


def generate() -> pd.DataFrame:
    rng = np.random.default_rng(SEED)
    sensor = rng.integers(0, 2, N)
    temp = rng.normal(22.0 + 1.6 * sensor, 1.2, N)
    humidity = rng.normal(40.0 - 2.5 * sensor, 2.5, N)
    light = np.abs(rng.normal(300 + 120 * sensor, 90, N))
    voltage = rng.normal(2.6 - 0.05 * sensor, 0.05, N)
    pdf = pd.DataFrame(
        {
            "temperature": np.round(temp, 3),
            "humidity": np.round(humidity, 3),
            "light": np.round(light, 1),
            "voltage": np.round(voltage, 4),
            "is_sensor_1": sensor,
        }
    )
    return inject_gross_outliers(
        pdf, ["temperature", "voltage", "humidity"], 0.04, rng, scale=30
    )


SPEC = DatasetSpec(
    name="Sensor",
    label="is_sensor_1",
    numeric=("temperature", "humidity", "light", "voltage"),
    error_types=("outliers",),
    generate=generate,
)
