"""Reproduce Figure 4/16 (tabular): fairness × accuracy quadrants."""
from _common import emit, get_spark

from repro.harness import Harness, synergies


def main(spark, scale: str = "bench"):
    h = Harness(spark, scale=scale)
    t = synergies(h)
    emit("fig4_synergies", t)
    return t


if __name__ == "__main__":
    main(get_spark("fig4"))
