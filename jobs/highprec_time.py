"""spark-submit entrypoint for Table F4 (Fig. 4: high-precision query time)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import scale, session

from repro.experiments.highprec import print_highprec

if __name__ == "__main__":
    spark = session("repro-highprec")
    df = print_highprec(spark, scale=scale())
    df.to_csv("results_table_f4.csv", index=False)
    spark.stop()
