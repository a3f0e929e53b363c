#!/usr/bin/env python
"""spark-submit entrypoint — E3 relative KG growth under continuous construction (Fig 12).

Run: `spark-submit jobs/e3_kg_growth.py` (or plain `python jobs/e3_kg_growth.py`).
Prints the experiment's paper-vs-measured table; see EXPERIMENTS.md.
"""
import inspect

from pyspark.sql import SparkSession

from repro.experiments import e3_growth as exp


def main() -> None:
    needs_spark = "spark" in inspect.signature(exp.run).parameters
    if needs_spark:
        spark = (
            SparkSession.builder.appName("e3_kg_growth")
            .config("spark.sql.autoBroadcastJoinThreshold", -1)
            .getOrCreate()
        )
        result = exp.run(spark)
    else:
        result = exp.run()
    print(exp.format_rows(result))


if __name__ == "__main__":
    main()
