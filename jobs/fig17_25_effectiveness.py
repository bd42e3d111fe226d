"""Effectiveness tables (Figs 17–25): precision/recall/F1 vs τ̂ and γ
on the real-dataset stand-ins, GBDA vs the three competitors, ground
truth = exact GED (bounded A*)."""
import pandas as pd
from _common import emit, get_spark

from repro.experiments.effectiveness import effectiveness_real


def main() -> None:
    spark = get_spark("fig17-25-effectiveness")
    try:
        frames = [
            effectiveness_real(spark, name)
            for name in ("AIDS", "Finger", "GREC")
        ]
        emit("fig17_25_effectiveness", pd.concat(frames, ignore_index=True))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
