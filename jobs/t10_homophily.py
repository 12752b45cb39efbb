"""T10 (Fig 6i): homophily baselines on heterophilous graph.

Run: ``python jobs/t10_homophily.py`` (or spark-submit). Parameters can be overridden
via the module's ``KWARGS`` dict below; defaults match EXPERIMENTS.md.
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parent))
from _common import emit, get_spark

from repro.experiments.tables import table_t10

KWARGS: dict = {}

if __name__ == "__main__":
    spark = get_spark()
    try:
        emit("t10_homophily", table_t10(spark, **KWARGS))
    finally:
        spark.stop()
