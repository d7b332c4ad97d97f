"""core subpackage of the JoinBoost reproduction."""
