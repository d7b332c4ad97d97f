"""baselines subpackage of the JoinBoost reproduction."""
