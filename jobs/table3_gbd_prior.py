"""Table 3: time/space of computing the GBD prior distribution."""
from _common import emit, get_spark

from repro.experiments.tables import table3


def main() -> None:
    spark = get_spark("table3-gbd-prior")
    try:
        emit("table3_gbd_prior", table3(spark))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
