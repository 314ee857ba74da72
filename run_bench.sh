#!/bin/bash
# Runs the full bench suite; output lands in /root/repo/bench_output.txt
cd /root/repo
sbt -batch "bench/test" > /root/repo/bench_output.txt 2>&1
echo "EXIT=$?" >> /root/repo/bench_output.txt
