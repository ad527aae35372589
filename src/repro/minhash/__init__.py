"""minhash subpackage of the GRASP reproduction."""
