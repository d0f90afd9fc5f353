"""spark-submit entrypoint for Table F6 (Figs. 5/6: ℓ1 error vs pushes)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import scale, session

from repro.experiments.convergence import print_convergence

if __name__ == "__main__":
    spark = session("repro-convergence")
    df = print_convergence(spark, scale=scale())
    df.to_csv("results_table_f6.csv", index=False)
    spark.stop()
