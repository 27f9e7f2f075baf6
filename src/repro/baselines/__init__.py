"""Baseline systems (Table 2): logical plans + physical constraints of
StarJoin, SEED, BiGJoin, BENU and RADS, all expressed in the paper's
uniform join-based framework, plus runners that execute them (natively
or plugged into HUGE) on the shared engine."""
