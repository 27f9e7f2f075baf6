"""Scheduling substrate: the BFS/DFS-adaptive scheduler simulation
(Algorithm 5, Theorem 5.4's memory bound) and the two-layer
work-stealing load balancer (§5.3)."""
