set -x
python jobs/run_table2.py --out results/table2.csv > results/table2.md 2> results/table2.log
python jobs/run_table3.py --out results/table3.csv > results/table3.md 2> results/table3.log
python jobs/run_table4.py --out results/table4.csv > results/table4.md 2> results/table4.log
python jobs/run_table5.py --out results/table5.csv > results/table5.md 2> results/table5.log
python jobs/run_table6.py --out results/table6.csv > results/table6.md 2> results/table6.log
echo DONE
