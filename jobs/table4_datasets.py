"""Reproduce Table 4: overview of the eight datasets."""
from _common import emit, get_spark

from repro.harness import Harness, table4


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = table4(h)
    emit("table4", t)
    return t


if __name__ == "__main__":
    main(get_spark("table4"))
