"""spark-submit entrypoint — build and save a SCAN index for a dataset.

Usage: spark-submit jobs/build_index.py <dataset> <out_dir> [measure]
"""
import sys

from repro.core.index import build_index
from repro.experiments import datasets
from repro.experiments.harness import get_session


def main() -> None:
    name, out = sys.argv[1], sys.argv[2]
    measure = sys.argv[3] if len(sys.argv) > 3 else datasets.measure_for(name)
    spark = get_session("build_index")
    g = datasets.load(spark, name)
    build_index(g, measure).save(out)
    print(f"saved {measure} index for {name} -> {out}")


if __name__ == "__main__":
    main()
