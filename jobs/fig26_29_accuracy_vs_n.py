"""Accuracy-vs-graph-size tables (Figs 26–29): GBDA precision/recall/F1
on Syn-1 with known-GED ground truth, across τ̂ and γ."""
from _common import emit, get_spark

from repro.experiments.effectiveness import accuracy_vs_n


def main() -> None:
    spark = get_spark("fig26-29-accuracy-vs-n")
    try:
        emit("fig26_29_accuracy_vs_n", accuracy_vs_n(spark, "Syn-1"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
