"""Table 4: time/space of computing the GED (Jeffreys) prior, with the
per-parallel-task breakdown the paper reports (ΣT, ΣS, max T, max S)."""
from _common import emit, get_spark

from repro.experiments.tables import table4


def main() -> None:
    spark = get_spark("table4-ged-prior")
    try:
        emit("table4_ged_prior", table4(spark, tau_hat=5))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
