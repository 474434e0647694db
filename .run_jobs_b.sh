export PYSPARK_SUBMIT_ARGS="--master local[8] --driver-memory 12g --conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell"
export SPARK_SHUFFLE_PARTITIONS=16
python jobs/table3_errors.py --sf 0.6 > results_table3.txt 2>&1
python jobs/exp5_pipeline.py --facts 10000 > results_exp5.txt 2>&1
python jobs/exp6_scalability.py --base-facts 30000 > results_exp6.txt 2>&1
