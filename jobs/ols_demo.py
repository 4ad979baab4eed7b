"""§8.6 workload 1 demo: OLS linear regression on BIXI-like trips.

Data preparation (joins, aggregation) runs relationally; the regression
is the RMA chain ``MMU(INV(CPD(A,A)), CPD(A,V))``. Prints the fitted
coefficients (true slope is 20, intercept 120).
"""
import sys

sys.path.insert(0, "jobs")
from _session import get_spark  # noqa: E402

from pyspark.sql import functions as F  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.workloads import ols  # noqa: E402

if __name__ == "__main__":
    spark = get_spark("ols-demo")
    try:
        trips = synth_data.trips(spark, n=20_000)
        st = synth_data.stations(spark)
        s1 = st.select(F.col("code").alias("start_station"), F.col("lat").alias("lat1"), F.col("lon").alias("lon1"))
        s2 = st.select(F.col("code").alias("end_station"), F.col("lat").alias("lat2"), F.col("lon").alias("lon2"))
        prepped = (
            trips.join(s1, "start_station")
            .join(s2, "end_station")
            .withColumn("distance", F.hypot(F.col("lat1") - F.col("lat2"), F.col("lon1") - F.col("lon2")))
            .select("trip_id", "distance", "duration")
        )
        beta = ols(prepped, "trip_id", ["distance"], "duration")
        print("OLS coefficients (duration ~ distance); true slope 20, intercept 120:")
        beta.orderBy("C").show()
    finally:
        spark.stop()
