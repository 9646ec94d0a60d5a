"""Reproduce Table 9 (App. D): Accuracy/F-1 of all 13 matchers × 8 datasets."""
from _common import emit, get_spark

from repro.harness import Harness, table9


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = table9(h)
    emit("table9", t)
    return t


if __name__ == "__main__":
    main(get_spark("table9"))
