"""Reproduce Table 7: threshold sensitivity of TPRP/PPVP unfairness."""
from _common import emit, get_spark

from repro.harness import Harness, table7


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = table7(h)
    emit("table7", t)
    return t


if __name__ == "__main__":
    main(get_spark("table7"))
