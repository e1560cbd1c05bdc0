#!/bin/bash
cd /root/repo/jobs
python table1.py --sf 0.02 --epochs 12 --train-batch 1024 --repeats 2 --out ../exp_out/table1.md > ../exp_out/table1.log 2>&1
python table2.py --sf 0.05 --epochs 15 --train-batch 1024 --repeats 2 --out ../exp_out/table2.md > ../exp_out/table2.log 2>&1
python table3.py --n-base 40000 --batch-size 5000 --out ../exp_out/table3.md > ../exp_out/table3.log 2>&1
python table4.py --n-base 40000 --batch-size 5000 --out ../exp_out/table4.md > ../exp_out/table4.log 2>&1
python table5.py --n-base 40000 --batch-size 5000 --out ../exp_out/table5.md > ../exp_out/table5.log 2>&1
touch /root/repo/exp_out/ALL_DONE
