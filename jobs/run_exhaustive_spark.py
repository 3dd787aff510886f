"""spark-submit entrypoint: Spark-parallel exhaustive grid sweep.

Usage: spark-submit jobs/run_exhaustive_spark.py [workload] [cluster]
Defaults to PageRank on Cluster A. Prints the top-10 configurations.
"""
import sys

import _common

from repro.tuners.exhaustive import cluster_by_name, exhaustive_search_spark
from repro.workloads import dominant_pool

if __name__ == "__main__":
    workload = sys.argv[1] if len(sys.argv) > 1 else "PageRank"
    cluster = cluster_by_name(sys.argv[2] if len(sys.argv) > 2 else "A")
    spark = _common.get_spark()
    try:
        result = exhaustive_search_spark(
            spark, workload, cluster, dominant_pool=dominant_pool(workload)
        )
        print(f"Exhaustive sweep: {workload} on Cluster {cluster.name} "
              f"({len(result)} configurations)")
        print(result.head(10).to_string(index=False))
    finally:
        spark.stop()
