"""spark-submit entrypoint reproducing Figure 9: top-K vs K.

Usage::

    spark-submit jobs/fig9_topk_k.py [store_root]

Environment: ``REPRO_SF`` overrides the benchmark scale knob where the
experiment takes one. Prints the figure's table of numbers (measured
scale + projected to the paper's 10 GB) next to the paper's reference
rows, then the headline shape checks.
"""
import os
import sys


def run(spark, store_root: str):
    from repro.experiments import fig9_topk_k as exp
    from repro.experiments import common
    from repro.s3sim import ObjectStore

    rows = exp.run(spark, ObjectStore(store_root))
    common.print_experiment('Figure 9: top-K vs K', rows, exp.PAPER)
    print("\nheadline:", exp.headline(rows))
    return rows


if __name__ == "__main__":
    from pyspark.sql import SparkSession

    session = (
        SparkSession.builder.appName('fig9_topk_k')
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    root = sys.argv[1] if len(sys.argv) > 1 else os.environ.get(
        "REPRO_STORE", "/tmp/pushdowndb-store"
    )
    run(session, root)
    session.stop()
