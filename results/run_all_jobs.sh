#!/bin/bash
# Runs every table job sequentially, teeing outputs under results/.
set -u
cd /root/repo
for job in table1_datasets table2_characterization table4_bounds_quality \
           table7_landmarks table3_efficiency table5_bounds_runtime table6_hclub; do
  echo "=== $job start $(date +%T) ==="
  timeout 2400 python jobs/${job}.py > results/${job}.txt 2> results/${job}.err
  echo "=== $job done  $(date +%T) exit=$? ==="
done
