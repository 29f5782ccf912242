#!/bin/bash
# Sequential experiment runs backing EXPERIMENTS.md (one Spark job at a time
# so the perf tables are not distorted by contention).
set -x
cd /root/repo
python jobs/table3_learning.py   --sf 0.1  --out results/table3.md
python jobs/table5_ncols.py      --sf 0.05 --out results/table5.md
python jobs/table6_normalized.py --sf 0.02 --rates 0.05 0.2 0.4 0.8 --out results/table6.md
python jobs/table4_single_table.py --sf 0.05 --out results/table4.md
python jobs/table7_quality.py    --sf 0.05 --out results/table7.md
python jobs/table8_patterns.py   --dataset flight   --sf 0.002 --out results/table8_flight.md
python jobs/table8_patterns.py   --dataset retailer --sf 0.01  --out results/table8_retailer.md
echo ALL_DONE
