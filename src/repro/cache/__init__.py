"""The LRBU cache (Algorithm 3), its crippled comparison variants
(Table 5), and the two-stage fetch/intersect replay simulator
(Algorithm 4) that drives them with real access traces."""
