"""Reproduce Table 6: FacultyMatch TPR/PPV per country group + disparities."""
from _common import emit, get_spark

from repro.harness import Harness, table6


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = table6(h)
    emit("table6", t)
    return t


if __name__ == "__main__":
    main(get_spark("table6"))
