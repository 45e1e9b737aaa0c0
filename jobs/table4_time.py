"""Table 4 standalone view: prints results/table4.csv if the grid job
already ran, otherwise runs the grid (see table3_accuracy.py — one grid
run yields both tables)."""
import os
import sys

import pandas as pd

sys.path.insert(0, os.path.join(os.path.dirname(__file__)))


def main() -> None:
    path = "results/table4.csv"
    if not os.path.exists(path):
        import table3_accuracy

        table3_accuracy.main()
    print(pd.read_csv(path).to_string(index=False))


if __name__ == "__main__":
    main()
