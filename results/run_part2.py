import sys
sys.path.insert(0, ".")
from jobs.common import get_spark, print_table
from jobs import (fig11_sampling_quality, fig12_sampling_runtime,
                  fig13_threshold_validation, fig14_grecall)

spark = get_spark("experiments-2")
out = fig14_grecall.run(spark, n=300, seed=0); print_table("FIG 14", out)
out.to_csv("results/fig14.csv", index=False)
out = fig12_sampling_runtime.run(spark, n=300, seed=0); print_table("FIG 12", out)
out.to_csv("results/fig12.csv", index=False)
out = fig13_threshold_validation.run(spark, n=300, seed=0); print_table("FIG 13", out)
out.to_csv("results/fig13.csv", index=False)
out = fig11_sampling_quality.run(spark, n=150, seed=0); print_table("FIG 11", out)
out.to_csv("results/fig11.csv", index=False)
spark.stop()
print("DONE-PART-2")
