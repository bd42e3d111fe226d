"""Online efficiency tables (Figs 14–16): query time per method.

Fig 14: real datasets × τ̂; Figs 15/16: Syn-1/Syn-2 subset size sweep
with the memory-model / time-cap feasibility walls.
"""
from _common import emit, get_spark

from repro.experiments.efficiency import (
    online_time_real,
    online_time_syn,
    per_pair_micro,
)


def main() -> None:
    spark = get_spark("fig14-16-efficiency")
    try:
        emit("fig14_per_pair_micro", per_pair_micro())
        emit("fig14_online_time_real", online_time_real(spark))
        emit("fig15_online_time_syn1", online_time_syn(spark, "Syn-1"))
        emit("fig16_online_time_syn2", online_time_syn(spark, "Syn-2"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
