"""Table 2: dataset statistics (scaled stand-ins vs paper numbers)."""
from _common import emit

from repro.experiments.tables import table2


def main() -> None:
    emit("table2_stats", table2())


if __name__ == "__main__":
    main()
