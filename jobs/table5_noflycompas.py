"""Reproduce Table 5: NoFlyCompas TPR/FDR per race group + disparities."""
from _common import emit, get_spark

from repro.harness import Harness, table5


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = table5(h)
    emit("table5", t)
    return t


if __name__ == "__main__":
    main(get_spark("table5"))
