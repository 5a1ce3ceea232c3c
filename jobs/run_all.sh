#!/bin/bash
# Regenerate every evaluation table into results/ (see DESIGN.md §4).
# SF / TOL tune total runtime; the defaults below finish in ~30 min on 16
# cores. Pass SF=0.05 TOL=1e-6 for a slower, closer-to-paper run.
set -u
cd "$(dirname "$0")"
mkdir -p ../results
SF="${SF:-0.015}"
TOL="${TOL:-1e-5}"

run() {
  name="$1"; shift
  echo "=== $name ==="
  python "$@" > "../results/${name}.txt" 2>"../results/${name}.err" \
    && echo "    ok" || echo "    FAILED (see results/${name}.err)"
}

# headline table first
run T2_overall_main   exp_overall.py --sf "$SF" --tol "$TOL" --algos sssp pagerank
run T2_overall_extra  exp_overall.py --sf "$SF" --tol "$TOL" --datasets uk_lite --algos bfs php
run T1_datasets       exp_datasets.py --sf "$SF"
run T4_breakdown      exp_breakdown.py --sf "$SF"
run T8_overhead       exp_overhead.py --sf "$SF" --rounds 9 --algo pagerank
run T7_replication    exp_replication.py --sf "$SF" --algos sssp pagerank --datasets uk_lite wb_lite
run T6_batch_size     exp_batch_size.py --sf "$SF" --ratios 1e-4 1e-3 1e-2 --systems ingress kickstarter graphbolt
run T3_vertex_updates exp_vertex_updates.py --sf "$SF" --tol "$TOL" --datasets uk_lite --algos sssp pagerank
run T5_threads_proxy  exp_threads.py --sf "$SF" --algos sssp pagerank
echo "ALL DONE"
