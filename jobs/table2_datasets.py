"""Table II — dataset characteristics: paper's shapes vs our scaled builds."""
from __future__ import annotations

import pandas as pd

from repro.streams.datasets import dataset_characteristics


def run(length_scale: float = 1.0) -> pd.DataFrame:
    return pd.DataFrame(dataset_characteristics(length_scale))


def main() -> None:
    df = run()
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
