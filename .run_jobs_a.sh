export PYSPARK_SUBMIT_ARGS="--master local[8] --driver-memory 12g --conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false pyspark-shell"
export SPARK_SHUFFLE_PARTITIONS=16
python jobs/table2_datasets.py --sf 0.6 --scores > results_table2.txt 2>&1
python jobs/table4_earlystop.py --sf 0.6 > results_table4.txt 2>&1
