"""Print Table 2 (cleaning methods) and Table 3 (dataset x error types).

    python jobs/print_registry.py
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "src"))


def main() -> None:
    import pandas as pd

    from repro.cleaning.registry import ERROR_TYPES, methods_for
    from repro.core.report import markdown_table
    from repro.datasets.registry import DATASETS

    rows = []
    for e in ERROR_TYPES:
        for m in methods_for(e):
            rows.append({"error_type": e, "detect": m.detect, "repair": m.repair})
    print("## Table 2 — cleaning methods")
    print(markdown_table(pd.DataFrame(rows)))

    rows = []
    for name, spec in DATASETS.items():
        if "_" in name:
            continue  # mislabel variants are listed via the base dataset
        rows.append(
            {"dataset": name}
            | {e: ("x" if e in spec.error_types else "") for e in ERROR_TYPES}
        )
    print("\n## Table 3 — dataset and error types")
    print(markdown_table(pd.DataFrame(rows)))


if __name__ == "__main__":
    main()
