export PYSPARK_SUBMIT_ARGS="--master local[8] --driver-memory 12g --conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell"
export SPARK_SHUFFLE_PARTITIONS=16
python jobs/table3_errors.py --sf 2.0 > results_table3_sf2.txt 2>&1
python jobs/table4_earlystop.py --sf 2.0 > results_table4_sf2.txt 2>&1
