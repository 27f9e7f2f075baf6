"""HUGE's core: execution plans, the Algorithm-1 optimiser, the dataflow
operators (SCAN / PULL-EXTEND / PUSH-JOIN / SINK), the Spark execution
engine, and the simulated-cluster accounting model."""
