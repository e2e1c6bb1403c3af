"""spark-submit entrypoint for the Table 2 reproduction harness."""
import sys

from pyspark.sql import SparkSession


def main() -> int:
    spark = SparkSession.builder.appName("table2").getOrCreate()
    from repro.eval.table2 import run_table2
    out = run_table2()
    print(f"table2: {len(out) if not isinstance(out, dict) else len(out['cells'])} rows/cells written to results/")
    spark.stop()
    return 0


if __name__ == "__main__":
    sys.exit(main())
