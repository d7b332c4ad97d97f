"""data subpackage of the JoinBoost reproduction."""
