"""Section 5 end-to-end demo: the ratings covariance pipeline (Figs. 5-7).

Runs the mixed relational/linear query of the paper on the Figure 5
micro-database and prints w3, w4, and w8 — the relations the paper shows.
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from pyspark.sql import functions as F  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.core import ops  # noqa: E402
from repro.workloads import covariance  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("covariance-demo")
    try:
        db = synth_data.ratings_db(spark)
        u, f, r = db["u"], db["f"], db["r"]
        # w1: ratings of California users
        w1 = (
            u.join(r, "User")
            .filter(F.col("State") == "CA")
            .select("User", "Balto", "Heat", "Net")
        )
        w7 = covariance(w1, "User")
        print("covariance relation (w7):")
        w7.orderBy("C").show()
        w8 = (
            w7.join(f, w7["C"] == f["Title"])
            .filter(F.col("Director") == "Lee")
            .select(F.col("Title").alias("T"), "Balto", "Heat", "Net")
        )
        print("Lee's films with similarities (w8):")
        w8.orderBy("T").show()
        print("transpose with origins (tra of w1, cf. Fig. 7):")
        ops.tra(w1, "User").orderBy("C").show()
    finally:
        spark.stop()
