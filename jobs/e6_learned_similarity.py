#!/usr/bin/env python
"""spark-submit entrypoint — E6 learned vs deterministic string similarity (§5.1).

Run: `spark-submit jobs/e6_learned_similarity.py` (or plain `python jobs/e6_learned_similarity.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e6_sim as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e6_learned_similarity")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
